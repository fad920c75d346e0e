"""Table 5 — dataset statistics (dims, size, sparsity).

Measured on the synthetic surrogates (DESIGN.md substitutions): row/col
counts and sparsity come from a generated sample; the size column reports
the DEN bytes of the sample plus the *extrapolated* size at the paper's
row count, so the scale relationship to the paper's numbers is explicit.
"""
from __future__ import annotations

import numpy as np

from repro import datasets
from repro.formats.dense import den_size_bytes

#: Paper's Table 5 (size in GB; text format except Deep1Billion binary).
PAPER = {
    "census": {"dims": "2.5M * 68", "size_gb": 0.46, "sparsity": 0.43, "rows": 2_500_000},
    "imagenet": {"dims": "1.2M * 900", "size_gb": 2.8, "sparsity": 0.31, "rows": 1_200_000},
    "mnist": {"dims": "8.1M * 784", "size_gb": 11.3, "sparsity": 0.25, "rows": 8_100_000},
    "kdd99": {"dims": "4M * 42", "size_gb": 1.6, "sparsity": 0.39, "rows": 4_000_000},
    "rcv1": {"dims": "800K * 47236", "size_gb": 0.96, "sparsity": 0.0016, "rows": 800_000},
    "deep1b": {"dims": "1B * 96", "size_gb": 475.0, "sparsity": 1.0, "rows": 1_000_000_000},
}


def rows(sample_rows: int = 1000, seed: int = 0) -> list[dict]:
    """Measured Table 5: one dict per dataset surrogate."""
    out = []
    for name, spec in datasets.SPECS.items():
        X, _ = datasets.generate(name, sample_rows, seed=seed)
        sp = datasets.sparsity_of(X)
        sample_bytes = den_size_bytes(*X.shape)
        paper_rows = PAPER[name]["rows"]
        out.append(
            {
                "dataset": name,
                "paper_name": spec.paper_name,
                "n_cols": spec.n_cols,
                "sample_rows": sample_rows,
                "sparsity": sp,
                "paper_sparsity": spec.paper_sparsity,
                "sample_den_mb": sample_bytes / 1e6,
                "extrapolated_den_gb": sample_bytes / sample_rows * paper_rows / 1e9,
                "paper_size_gb": PAPER[name]["size_gb"],
                "paper_dims": PAPER[name]["dims"],
            }
        )
    return out


def rows_spark(spark, sample_rows: int = 1000, seed: int = 0) -> list[dict]:
    """Table 5 computed through Spark DataFrame aggregation (Catalyst),
    cross-checkable against the numpy path and the DuckDB oracle."""
    from repro.dist import batching, metrics

    out = []
    for name, spec in datasets.SPECS.items():
        X, y = datasets.generate(name, sample_rows, seed=seed)
        df = batching.to_feature_df(spark, X, y)
        stats = metrics.dataset_stats(df, spec.n_cols).collect()[0]
        out.append(
            {
                "dataset": name,
                "n_rows": stats["n_rows"],
                "n_cols": stats["n_cols"],
                "sparsity": stats["sparsity"],
                "den_bytes": stats["den_bytes"],
            }
        )
    return out


def format_table(measured: list[dict]) -> str:
    header = (
        f"{'dataset':10s} {'paper dims':14s} {'cols':>5s} {'sparsity':>9s} "
        f"{'paper sp':>9s} {'extrap GB':>10s} {'paper GB':>9s}"
    )
    lines = [header, "-" * len(header)]
    for r in measured:
        lines.append(
            f"{r['dataset']:10s} {r['paper_dims']:14s} {r['n_cols']:5d} "
            f"{r['sparsity']:9.4f} {r['paper_sparsity']:9.4f} "
            f"{r['extrapolated_den_gb']:10.2f} {r['paper_size_gb']:9.2f}"
        )
    return "\n".join(lines)
