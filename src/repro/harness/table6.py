"""Table 6 — end-to-end MGD runtimes on Imagenet and Mnist.

Paper setting: batch size 250, 10 epochs, NN/LR/SVM, datasets scaled to
1m rows (fits in 15 GB RAM for every format) and 25m rows (only
TOC/Snappy/Gzip fit). We measure real compute on 1000 surrogate rows and
scale per DESIGN.md's substitution; ``PAPER`` holds the published minutes
for EXPERIMENTS.md's side-by-side diff. Spark rows stand in for the
Bismarck-integration rows.
"""
from __future__ import annotations

from repro.harness import mgd_runtime as engine

#: Paper Table 6, minutes. None = N/A in the paper.
PAPER = {
    ("imagenet", "1m"): {
        "TOC": {"NN": 12.3, "LR": 0.7, "SVM": 0.7},
        "DEN": {"NN": 14.6, "LR": 3.9, "SVM": 3.8},
        "CSR": {"NN": 12.7, "LR": 2.1, "SVM": 2.1},
        "CVI": {"NN": 12.5, "LR": 1.0, "SVM": 1.1},
        "DVI": {"NN": 13.0, "LR": 1.2, "SVM": 1.2},
        "Snappy": {"NN": 14.8, "LR": 3.9, "SVM": 4.0},
        "Gzip": {"NN": 20.8, "LR": 11.7, "SVM": 12.5},
        "SparkTOC": {"NN": 12.6, "LR": 0.76, "SVM": 0.77},  # BismarckTOC
        "SparkDEN": {"NN": None, "LR": 3.5, "SVM": 3.2},  # BismarckDEN
        "SparkCSR": {"NN": None, "LR": 2.4, "SVM": 2.2},  # BismarckCSR
    },
    ("imagenet", "25m"): {
        "TOC": {"NN": 249, "LR": 13, "SVM": 13},
        "DEN": {"NN": 666, "LR": 374, "SVM": 360},
        "CSR": {"NN": 428, "LR": 199, "SVM": 187},
        "CVI": {"NN": 323, "LR": 98, "SVM": 83},
        "DVI": {"NN": 311, "LR": 73.1, "SVM": 63},
        "Snappy": {"NN": 348, "LR": 126, "SVM": 127},
        "Gzip": {"NN": 463, "LR": 247, "SVM": 255},
        "SparkTOC": {"NN": 264, "LR": 13.8, "SVM": 13.7},
        "SparkDEN": {"NN": None, "LR": 309, "SVM": 310},
        "SparkCSR": {"NN": None, "LR": 141, "SVM": 134},
    },
    ("mnist", "1m"): {
        "TOC": {"NN": 9.0, "LR": 2.1, "SVM": 2.1},
        "DEN": {"NN": 15.8, "LR": 7.9, "SVM": 7.8},
        "CSR": {"NN": 10.8, "LR": 1.6, "SVM": 1.6},
        "CVI": {"NN": 9.6, "LR": 1.4, "SVM": 1.4},
        "DVI": {"NN": 14.5, "LR": 6.2, "SVM": 6.4},
        "Snappy": {"NN": 15.8, "LR": 8.5, "SVM": 8.4},
        "Gzip": {"NN": 20.5, "LR": 12.6, "SVM": 12.9},
        "SparkTOC": {"NN": 10.3, "LR": 2.2, "SVM": 2.2},
        "SparkDEN": {"NN": None, "LR": 7.2, "SVM": 7.1},
        "SparkCSR": {"NN": None, "LR": 1.8, "SVM": 1.7},
    },
    ("mnist", "25m"): {
        "TOC": {"NN": 182, "LR": 52, "SVM": 54},
        "DEN": {"NN": 708, "LR": 526, "SVM": 545},
        "CSR": {"NN": 346, "LR": 156, "SVM": 155},
        "CVI": {"NN": 250, "LR": 92, "SVM": 91.6},
        "DVI": {"NN": 385, "LR": 224, "SVM": 226},
        "Snappy": {"NN": 363, "LR": 210, "SVM": 213},
        "Gzip": {"NN": 393, "LR": 238, "SVM": 243},
        "SparkTOC": {"NN": 198, "LR": 54, "SVM": 57},
        "SparkDEN": {"NN": None, "LR": 428, "SVM": 421},
        "SparkCSR": {"NN": None, "LR": 114, "SVM": 110},
    },
}

SCALES = {"1m": 1_000_000, "25m": 25_000_000}
DATASETS = ["imagenet", "mnist"]


def rows(
    actual_rows: int = 1000,
    epochs_measured: int = 2,
    models: list[str] | None = None,
    methods: list[str] | None = None,
    seed: int = 0,
) -> list[engine.CellResult]:
    """Run the local (non-Spark) cells of Table 6."""
    out = []
    for dataset in DATASETS:
        for scale_name, virtual in SCALES.items():
            for model in models or engine.MODELS:
                for method in methods or engine.LOCAL_METHODS:
                    out.append(
                        engine.run_cell(
                            dataset,
                            model,
                            method,
                            virtual_rows=virtual,
                            scale_name=scale_name,
                            actual_rows=actual_rows,
                            epochs_measured=epochs_measured,
                            seed=seed,
                        )
                    )
    return out


def spark_rows(
    spark,
    actual_rows: int = 1000,
    models: list[str] | None = None,
    methods: list[str] | None = None,
    seed: int = 0,
) -> list[engine.CellResult]:
    """The ML-system rows (SparkTOC/SparkDEN/SparkCSR ~ Bismarck rows)."""
    out = []
    for dataset in DATASETS:
        for scale_name, virtual in SCALES.items():
            for model in models or ["LR"]:
                for method in methods or ["TOC", "DEN", "CSR"]:
                    out.append(
                        engine.run_spark_cell(
                            spark,
                            dataset,
                            model,
                            method,
                            virtual_rows=virtual,
                            scale_name=scale_name,
                            actual_rows=actual_rows,
                            seed=seed,
                        )
                    )
    return out
