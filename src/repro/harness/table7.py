"""Table 7 (Appendix D.2) — end-to-end MGD runtimes on Census and Kdd99.

Same protocol as Table 6 (see :mod:`repro.harness.table6`); scales are
15m/290m rows for Census and 7m/200m for Kdd99, per the paper.
"""
from __future__ import annotations

from repro.harness import mgd_runtime as engine

#: Paper Table 7, minutes. None = N/A in the paper.
PAPER = {
    ("census", "15m"): {
        "TOC": {"NN": 35, "LR": 0.8, "SVM": 0.7},
        "DEN": {"NN": 39, "LR": 4.0, "SVM": 4.0},
        "CSR": {"NN": 38, "LR": 1.8, "SVM": 1.8},
        "CVI": {"NN": 37, "LR": 1.1, "SVM": 1.0},
        "DVI": {"NN": 38, "LR": 1.2, "SVM": 1.1},
        "Snappy": {"NN": 41, "LR": 4.7, "SVM": 4.6},
        "Gzip": {"NN": 46, "LR": 11.1, "SVM": 11.1},
        "SparkTOC": {"NN": 38, "LR": 0.87, "SVM": 0.88},
        "SparkDEN": {"NN": None, "LR": 4.2, "SVM": 4.3},
        "SparkCSR": {"NN": None, "LR": 3.2, "SVM": 3.2},
    },
    ("census", "290m"): {
        "TOC": {"NN": 702, "LR": 16, "SVM": 14},
        "DEN": {"NN": 1108, "LR": 253, "SVM": 251},
        "CSR": {"NN": 942, "LR": 161, "SVM": 167},
        "CVI": {"NN": 844, "LR": 80, "SVM": 67},
        "DVI": {"NN": 800, "LR": 46, "SVM": 43},
        "Snappy": {"NN": 905, "LR": 121, "SVM": 115},
        "Gzip": {"NN": 965, "LR": 244, "SVM": 241},
        "SparkTOC": {"NN": 742, "LR": 17.4, "SVM": 14.8},
        "SparkDEN": {"NN": None, "LR": 321, "SVM": 310},
        "SparkCSR": {"NN": None, "LR": 222, "SVM": 234},
    },
    ("kdd99", "7m"): {
        "TOC": {"NN": 16.1, "LR": 0.2, "SVM": 0.2},
        "DEN": {"NN": 29, "LR": 4.6, "SVM": 4.4},
        "CSR": {"NN": 19.2, "LR": 0.4, "SVM": 0.4},
        "CVI": {"NN": 18.5, "LR": 0.3, "SVM": 0.3},
        "DVI": {"NN": 28.4, "LR": 1.2, "SVM": 1.1},
        "Snappy": {"NN": 27.2, "LR": 3.5, "SVM": 3.5},
        "Gzip": {"NN": 33.5, "LR": 7.5, "SVM": 7.5},
        "SparkTOC": {"NN": 16.8, "LR": 0.3, "SVM": 0.31},
        "SparkDEN": {"NN": None, "LR": 4.0, "SVM": 3.8},
        "SparkCSR": {"NN": None, "LR": 0.9, "SVM": 0.9},
    },
    ("kdd99", "200m"): {
        "TOC": {"NN": 323, "LR": 6.1, "SVM": 5.9},
        "DEN": {"NN": 1003, "LR": 608, "SVM": 615},
        "CSR": {"NN": 438, "LR": 56, "SVM": 53},
        "CVI": {"NN": 422, "LR": 31, "SVM": 30},
        "DVI": {"NN": 611, "LR": 71, "SVM": 71},
        "Snappy": {"NN": 616, "LR": 127, "SVM": 128},
        "Gzip": {"NN": 683, "LR": 235, "SVM": 235},
        "SparkTOC": {"NN": 329, "LR": 6.4, "SVM": 6.3},
        "SparkDEN": {"NN": None, "LR": 645, "SVM": 644},
        "SparkCSR": {"NN": None, "LR": 114, "SVM": 115},
    },
}

SCALES = {
    "census": {"15m": 15_000_000, "290m": 290_000_000},
    "kdd99": {"7m": 7_000_000, "200m": 200_000_000},
}
DATASETS = ["census", "kdd99"]


def rows(
    actual_rows: int = 1000,
    epochs_measured: int = 2,
    models: list[str] | None = None,
    methods: list[str] | None = None,
    seed: int = 0,
) -> list[engine.CellResult]:
    """Run the local (non-Spark) cells of Table 7."""
    out = []
    for dataset in DATASETS:
        for scale_name, virtual in SCALES[dataset].items():
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
        for scale_name, virtual in SCALES[dataset].items():
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
