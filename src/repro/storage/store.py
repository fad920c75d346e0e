"""Byte-budgeted mini-batch store with modeled disk IO.

The paper's large-dataset results (Tables 6–7, 25m/290m/200m rows) hinge
on one mechanism: on a 15 GB machine, only some formats' compressed
batches fit in RAM; the rest live on disk and every epoch re-reads them
(Figure 1A: IO time dwarfs CPU time). At laptop scale real files are too
small for the effect to show up in wall time, so the store models it:

- batches are admitted to the in-memory dict until ``budget_bytes`` is
  exhausted; overflow batches are written to ``spill_dir`` (real files, so
  the code path is exercised end-to-end);
- every ``get`` of a spilled batch reads the file back and accrues
  ``bytes / bandwidth_bytes_per_s`` into ``modeled_io_seconds``;
- the one-time initial load of *all* batches (the paper's "TOC uses 10 s
  to read the data while CVI takes 36 s") is modeled by
  ``initial_load_seconds()``.

Harnesses report measured compute seconds and modeled IO seconds
separately (EXPERIMENTS.md shows both).
"""
from __future__ import annotations

import os
import tempfile

#: Default modeled disk bandwidth — a 2019 cloud block device (~150 MB/s).
DEFAULT_BANDWIDTH = 150e6


class BatchStore:
    """Holds serialized mini-batch blobs under a memory budget."""

    def __init__(
        self,
        budget_bytes: int | None = None,
        spill_dir: str | None = None,
        bandwidth_bytes_per_s: float = DEFAULT_BANDWIDTH,
    ) -> None:
        self.budget_bytes = budget_bytes  # None = unbounded (big-RAM machine)
        self.bandwidth = float(bandwidth_bytes_per_s)
        self._mem: dict[int, bytes] = {}
        self._spilled: dict[int, str] = {}
        self._mem_bytes = 0
        self._spilled_bytes = 0
        self._total_bytes = 0
        self.modeled_io_seconds = 0.0
        self._tmp = None
        if spill_dir is None:
            self._tmp = tempfile.TemporaryDirectory(prefix="repro-spill-")
            spill_dir = self._tmp.name
        os.makedirs(spill_dir, exist_ok=True)
        self._spill_dir = spill_dir

    # -- writes ----------------------------------------------------------
    def put(self, batch_id: int, blob: bytes) -> None:
        """Admit to memory if the budget allows, else spill to disk."""
        self._total_bytes += len(blob)
        if self.budget_bytes is None or self._mem_bytes + len(blob) <= self.budget_bytes:
            self._mem[batch_id] = blob
            self._mem_bytes += len(blob)
        else:
            path = os.path.join(self._spill_dir, f"batch-{batch_id}.bin")
            with open(path, "wb") as f:
                f.write(blob)
            self._spilled[batch_id] = path
            self._spilled_bytes += len(blob)

    # -- reads -----------------------------------------------------------
    def get(self, batch_id: int) -> bytes:
        """Fetch a blob; spilled fetches accrue modeled IO time."""
        if batch_id in self._mem:
            return self._mem[batch_id]
        path = self._spilled[batch_id]
        with open(path, "rb") as f:
            blob = f.read()
        self.modeled_io_seconds += len(blob) / self.bandwidth
        return blob

    def batch_ids(self) -> list[int]:
        return sorted(list(self._mem) + list(self._spilled))

    # -- accounting ------------------------------------------------------
    @property
    def total_bytes(self) -> int:
        return self._total_bytes

    @property
    def memory_bytes(self) -> int:
        return self._mem_bytes

    @property
    def spilled_bytes(self) -> int:
        return self._spilled_bytes

    @property
    def fits_in_memory(self) -> bool:
        return self._spilled_bytes == 0

    def initial_load_seconds(self) -> float:
        """Modeled one-time cost of reading every batch from disk once."""
        return self._total_bytes / self.bandwidth

    def reset_io_clock(self) -> None:
        self.modeled_io_seconds = 0.0
