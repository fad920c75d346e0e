"""Mini-batch compression format zoo (paper §5 "Compared Methods").

Every format implements the interface documented in
:mod:`repro.formats.base` and is registered here by its paper name.
"""
from repro.core.toc import TOCMatrix
from repro.formats.cla import CLABatch
from repro.formats.codec import GzipBatch, SnappyBatch
from repro.formats.csr import CSRBatch, CVIBatch
from repro.formats.dense import DENBatch, DVIBatch

#: name -> format class, names as in the paper's evaluation.
REGISTRY = {
    "TOC": TOCMatrix,
    "DEN": DENBatch,
    "CSR": CSRBatch,
    "CVI": CVIBatch,
    "DVI": DVIBatch,
    "CLA": CLABatch,
    "Snappy": SnappyBatch,
    "Gzip": GzipBatch,
}


def get_format(name: str):
    """Look up a format class by its paper name (KeyError on unknown)."""
    return REGISTRY[name]
