"""TOC core: sparse/logical/physical encoding and compressed kernels.

Layer map (paper §3–§4):

- :mod:`repro.core.sparse`      — sparse encoding (CSR triplet arrays)
- :mod:`repro.core.prefix_tree` — encode-side prefix tree (AddNode/GetIndex)
- :mod:`repro.core.logical`     — Algorithm 1 (PrefixTreeEncode) and decode
- :mod:`repro.core.tree`        — Algorithm 2 (BuildPrefixTree, decode tree C')
- :mod:`repro.core.physical`    — bit packing + value indexing
- :mod:`repro.core.ops`         — Algorithms 3–8 / Theorems 1–4 kernels
- :mod:`repro.core.toc`         — `TOCMatrix` facade + byte (de)serialization
"""
from repro.core.toc import TOCMatrix  # noqa: F401
