"""The uniform mini-batch format interface.

Duck-typed rather than ABC-enforced (numpy-heavy classes gain nothing from
abstract bases), but every format class in the registry provides:

- ``name``: class attr, the paper's name for the method.
- ``encode(dense) -> batch`` (classmethod): compress a dense float matrix.
- ``decode() -> ndarray``: lossless reconstruction.
- ``size_bytes() -> int``: compressed size — numerator/denominator of the
  paper's compression ratios (ratio = DEN size / method size).
- ``to_bytes() / from_bytes(buf)``: serialization, used by the Spark layer
  to ship batches as binary blobs and by the batch store to spill to disk.
- the op suite of Table 1 / §4: ``scal(c)`` (A*c, returns a new batch),
  ``dot_vec(v)`` (A·v), ``vec_dot(v)`` (v·A), ``dot_mat(M)`` (A·M),
  ``mat_dot(M)`` (M·A), ``add_scalar(c)`` (sparse-unsafe A.+c, returns a
  dense ndarray).
- ``shape``: (n_rows, n_cols).

``check_batch_interface`` is used by tests to enforce the contract.
"""
from __future__ import annotations

_REQUIRED_METHODS = (
    "decode",
    "size_bytes",
    "to_bytes",
    "scal",
    "dot_vec",
    "vec_dot",
    "dot_mat",
    "mat_dot",
    "add_scalar",
)


def check_batch_interface(batch: object) -> list[str]:
    """Return the list of missing interface members (empty = compliant)."""
    missing = [m for m in _REQUIRED_METHODS if not callable(getattr(batch, m, None))]
    if not hasattr(batch, "shape"):
        missing.append("shape")
    if not hasattr(type(batch), "encode"):
        missing.append("encode")
    if not hasattr(type(batch), "from_bytes"):
        missing.append("from_bytes")
    if not getattr(type(batch), "name", None):
        missing.append("name")
    return missing
