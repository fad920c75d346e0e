"""BatchStore tests: budget admission, real disk spill, modeled IO."""
import os

import numpy as np
import pytest

from repro.storage import BatchStore


def _blob(size, fill=b"x"):
    return fill * size


class TestAdmission:
    def test_unbounded_keeps_everything_in_memory(self):
        store = BatchStore(budget_bytes=None)
        for i in range(10):
            store.put(i, _blob(1000))
        assert store.fits_in_memory
        assert store.memory_bytes == 10_000
        assert store.spilled_bytes == 0

    def test_budget_spills_overflow(self):
        store = BatchStore(budget_bytes=2500)
        for i in range(5):
            store.put(i, _blob(1000))
        assert store.memory_bytes == 2000
        assert store.spilled_bytes == 3000
        assert not store.fits_in_memory

    def test_total_bytes(self):
        store = BatchStore(budget_bytes=1500)
        store.put(0, _blob(1000))
        store.put(1, _blob(1000))
        assert store.total_bytes == 2000

    def test_batch_ids_sorted_union(self):
        store = BatchStore(budget_bytes=1000)
        for i in (3, 1, 2):
            store.put(i, _blob(600))
        assert store.batch_ids() == [1, 2, 3]


class TestSpillFiles:
    def test_spilled_blob_readable_and_identical(self, tmp_path):
        store = BatchStore(budget_bytes=100, spill_dir=str(tmp_path))
        payload = np.random.default_rng(0).bytes(5000)
        store.put(7, payload)
        assert store.get(7) == payload
        assert any(f.startswith("batch-7") for f in os.listdir(tmp_path))

    def test_memory_blob_identical(self):
        store = BatchStore(budget_bytes=None)
        store.put(1, b"abc")
        assert store.get(1) == b"abc"


class TestModeledIO:
    def test_memory_reads_cost_nothing(self):
        store = BatchStore(budget_bytes=None)
        store.put(0, _blob(10_000))
        store.get(0)
        assert store.modeled_io_seconds == 0.0

    def test_spilled_reads_accrue_bytes_over_bandwidth(self):
        store = BatchStore(budget_bytes=0, bandwidth_bytes_per_s=1000.0)
        store.put(0, _blob(500))
        store.get(0)
        assert store.modeled_io_seconds == pytest.approx(0.5)
        store.get(0)
        assert store.modeled_io_seconds == pytest.approx(1.0)

    def test_reset_io_clock(self):
        store = BatchStore(budget_bytes=0, bandwidth_bytes_per_s=1000.0)
        store.put(0, _blob(500))
        store.get(0)
        store.reset_io_clock()
        assert store.modeled_io_seconds == 0.0

    def test_initial_load_covers_all_bytes(self):
        store = BatchStore(budget_bytes=600, bandwidth_bytes_per_s=100.0)
        store.put(0, _blob(500))
        store.put(1, _blob(500))
        assert store.initial_load_seconds() == pytest.approx(10.0)


class TestFormatIntegration:
    def test_roundtrip_through_spill(self, tmp_path):
        from repro.formats import REGISTRY

        X = np.random.default_rng(1).choice([0.0, 1.5, 2.5], size=(40, 8))
        store = BatchStore(budget_bytes=0, spill_dir=str(tmp_path))
        blob = REGISTRY["TOC"].encode(X).to_bytes()
        store.put(0, blob)
        again = REGISTRY["TOC"].from_bytes(store.get(0))
        np.testing.assert_array_equal(again.decode(), X)

    def test_epoch_reread_pattern(self):
        # The Table 6/7 mechanism: per-epoch modeled IO equals the spilled
        # byte volume over bandwidth, every epoch.
        store = BatchStore(budget_bytes=1000, bandwidth_bytes_per_s=1e6)
        for i in range(4):
            store.put(i, _blob(500))  # 2 in memory, 2 spilled
        for epoch in range(3):
            store.reset_io_clock()
            for i in store.batch_ids():
                store.get(i)
            assert store.modeled_io_seconds == pytest.approx(1000 / 1e6)
