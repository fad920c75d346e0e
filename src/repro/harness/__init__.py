"""Evaluation-table harnesses: one module per paper table (5, 6, 7).

Each module exposes ``rows()`` returning the measured table as a list of
dicts, a ``PAPER`` constant with the published numbers, and ``format_table``
for job output. ``repro.harness.mgd_runtime`` is the shared engine behind
Tables 6 and 7.
"""
