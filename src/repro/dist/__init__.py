"""Spark integration — the "TOC inside a host data system" layer.

The Bismarck-integration analog (paper Appendix D.1): compressed
mini-batches are stored as binary blobs in a DataFrame (the database
table), and training runs inside executors via Arrow-backed pandas UDFs
(the in-RDBMS UDF). See :mod:`repro.dist.batching`,
:mod:`repro.dist.train`, :mod:`repro.dist.metrics`.
"""
