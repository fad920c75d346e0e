"""Shared engine for the end-to-end MGD runtime tables (Tables 6 and 7).

Protocol per (dataset, scale, model, method) cell:

1. Generate ``actual_rows`` surrogate rows, shuffle once, compress into
   250-row mini-batches, serialize, and insert into a
   :class:`repro.storage.BatchStore`.
2. The paper's scales (1m/25m/... rows on a 15 GB machine) are mapped to
   a *virtual scale factor* ``virtual_rows / actual_rows``: the store's
   budget is ``ram_bytes / scale``, so the fraction of batches that spill
   at actual scale equals the fraction that would spill at virtual scale.
   This reproduces the which-format-fits-in-RAM mechanism of §5.3 at
   laptop scale (see DESIGN.md substitutions).
3. Train for ``epochs_measured`` epochs reading every batch through the
   store each epoch (deserialize per visit; codec formats additionally
   decompress per visit). Wall-clock compute is measured.
4. Report virtual-scale numbers: compute extrapolates linearly in rows
   and epochs; IO = modeled initial load + per-epoch re-read of spilled
   bytes at ``bandwidth`` (150 MB/s default).

Rows report compute and IO separately so EXPERIMENTS.md can show what is
measured vs modeled.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from repro import datasets
from repro.formats import get_format
from repro.ml import mgd
from repro.ml.models import make_model
from repro.storage import BatchStore

#: Paper machine: 15 GB RAM, ~150 MB/s cloud block storage.
RAM_BYTES = 15e9
BANDWIDTH = 150e6

LOCAL_METHODS = ["TOC", "DEN", "CSR", "CVI", "DVI", "Snappy", "Gzip"]
MODELS = ["NN", "LR", "SVM"]


@dataclass
class CellResult:
    dataset: str
    scale_name: str
    model: str
    method: str
    compute_min: float  # virtual-scale compute, minutes
    io_min: float  # virtual-scale modeled IO, minutes
    total_min: float
    fits_in_memory: bool
    compression_ratio: float
    measured_compute_s: float  # actual measured seconds (before scaling)

    def as_dict(self) -> dict:
        return dict(self.__dict__)


def _build_store(
    X: np.ndarray,
    y: np.ndarray,
    method: str,
    batch_size: int,
    seed: int,
    budget_bytes: float | None,
) -> tuple[BatchStore, list[np.ndarray], int]:
    """Compress shuffled mini-batches into a budgeted store."""
    fmt = get_format(method)
    batch_set = mgd.make_batches(X, y, fmt, batch_size=batch_size, seed=seed)
    store = BatchStore(
        budget_bytes=None if budget_bytes is None else int(budget_bytes),
        bandwidth_bytes_per_s=BANDWIDTH,
    )
    den_bytes = 0
    for i, b in enumerate(batch_set.batches):
        store.put(i, b.to_bytes())
        n, m = b.shape
        den_bytes += 12 + 8 * n * m
    return store, batch_set.labels, den_bytes


def run_cell(
    dataset: str,
    model_kind: str,
    method: str,
    virtual_rows: int,
    scale_name: str,
    actual_rows: int = 1000,
    epochs_virtual: int = 10,
    epochs_measured: int = 2,
    batch_size: int = 250,
    seed: int = 0,
) -> CellResult:
    """Measure one table cell; see module docstring for the protocol."""
    spec = datasets.SPECS[dataset]
    X, y = datasets.generate(dataset, actual_rows, seed=seed)
    scale = virtual_rows / actual_rows
    store, labels, den_bytes = _build_store(
        X, y, method, batch_size, seed, budget_bytes=RAM_BYTES / scale
    )
    fmt = get_format(method)
    n_classes = spec.n_classes
    model = make_model(model_kind, spec.n_cols, n_classes=n_classes, seed=seed)
    enc_labels = [mgd.encode_labels(model_kind, l, n_classes) for l in labels]

    # Paper memory model: batches that fit in RAM live there as *parsed*
    # compressed objects (C++ keeps the compressed matrix object
    # resident); spilled batches are re-read and re-parsed every visit.
    resident: dict[int, object] = {
        i: fmt.from_bytes(store.get(i))
        for i in store.batch_ids()
        if i in store._mem
    }
    # One untimed warmup epoch: the measured window must reflect the
    # steady-state per-visit cost (it is extrapolated to millions of
    # virtual visits), not first-visit effects — lazy C' construction,
    # allocator first-touch — that happen once per resident batch.
    for i in store.batch_ids():
        batch = resident.get(i) or fmt.from_bytes(store.get(i))
        visit = getattr(batch, "begin_step", None)
        if visit is not None:
            visit()
        model.step(batch, enc_labels[i], lr=0.05)
        leave = getattr(batch, "end_step", None)
        if leave is not None:
            leave()
    store.reset_io_clock()
    t0 = time.perf_counter()
    for _ in range(epochs_measured):
        for i in store.batch_ids():
            batch = resident.get(i)
            if batch is None:
                batch = fmt.from_bytes(store.get(i))
            visit = getattr(batch, "begin_step", None)
            if visit is not None:
                visit()
            model.step(batch, enc_labels[i], lr=0.05)
            leave = getattr(batch, "end_step", None)
            if leave is not None:
                leave()
    measured_s = time.perf_counter() - t0

    per_epoch_spill_s = store.modeled_io_seconds / epochs_measured
    compute_virtual_s = measured_s / epochs_measured * epochs_virtual * scale
    io_virtual_s = (
        store.initial_load_seconds() * scale
        + per_epoch_spill_s * scale * epochs_virtual
    )
    return CellResult(
        dataset=dataset,
        scale_name=scale_name,
        model=model_kind,
        method=method,
        compute_min=compute_virtual_s / 60,
        io_min=io_virtual_s / 60,
        total_min=(compute_virtual_s + io_virtual_s) / 60,
        fits_in_memory=store.fits_in_memory,
        compression_ratio=den_bytes / store.total_bytes,
        measured_compute_s=measured_s,
    )


def run_spark_cell(
    spark,
    dataset: str,
    model_kind: str,
    method: str,
    virtual_rows: int,
    scale_name: str,
    actual_rows: int = 1000,
    epochs_virtual: int = 10,
    epochs_measured: int = 1,
    batch_size: int = 250,
    seed: int = 0,
) -> CellResult:
    """The ML-system-integration rows (BismarckTOC analog → Spark<fmt>).

    Trains through the Spark blob table + mapInPandas trainer; IO is
    modeled from the same store/budget math as the local cells.
    """
    from repro.dist import batching, train

    spec = datasets.SPECS[dataset]
    X, y = datasets.generate(dataset, actual_rows, seed=seed)
    scale = virtual_rows / actual_rows
    store, _, den_bytes = _build_store(
        X, y, method, batch_size, seed, budget_bytes=RAM_BYTES / scale
    )
    df = batching.assign_batches(batching.to_feature_df(spark, X, y), batch_size, seed)
    blob_df = batching.encode_batches(df, method).cache()
    blob_df.count()  # materialize encode outside the timed window

    t0 = time.perf_counter()
    train.train_distributed(
        blob_df,
        model_kind,
        spec.n_cols,
        n_classes=spec.n_classes,
        epochs=epochs_measured,
        lr=0.05,
        seed=seed,
    )
    measured_s = time.perf_counter() - t0
    blob_df.unpersist()

    # Model one epoch of spilled re-reads without re-training.
    store.reset_io_clock()
    for i in store.batch_ids():
        store.get(i)
    per_epoch_spill_s = store.modeled_io_seconds
    compute_virtual_s = measured_s / epochs_measured * epochs_virtual * scale
    io_virtual_s = (
        store.initial_load_seconds() * scale
        + per_epoch_spill_s * scale * epochs_virtual
    )
    return CellResult(
        dataset=dataset,
        scale_name=scale_name,
        model=model_kind,
        method=f"Spark{method}",
        compute_min=compute_virtual_s / 60,
        io_min=io_virtual_s / 60,
        total_min=(compute_virtual_s + io_virtual_s) / 60,
        fits_in_memory=store.fits_in_memory,
        compression_ratio=den_bytes / store.total_bytes,
        measured_compute_s=measured_s,
    )


def format_rows(rows: list[CellResult | dict]) -> str:
    """Fixed-width text rendering of table rows for jobs and logs."""
    dicts = [r.as_dict() if isinstance(r, CellResult) else r for r in rows]
    header = (
        f"{'dataset':10s} {'scale':10s} {'model':5s} {'method':10s} "
        f"{'total_min':>9s} {'compute':>8s} {'io_min':>7s} {'fits':>5s} {'ratio':>6s}"
    )
    lines = [header, "-" * len(header)]
    for r in dicts:
        lines.append(
            f"{r['dataset']:10s} {r['scale_name']:10s} {r['model']:5s} {r['method']:10s} "
            f"{r['total_min']:9.2f} {r['compute_min']:8.2f} {r['io_min']:7.2f} "
            f"{str(r['fits_in_memory']):>5s} {r['compression_ratio']:6.1f}"
        )
    return "\n".join(lines)
