"""Result-file sink for benchmark harnesses.

pytest captures stdout, so the table rows printed by bench targets never
reach ``bench_output.txt``; each bench additionally appends its rows here,
under ``benchmarks/results/``, which EXPERIMENTS.md references.
"""
from __future__ import annotations

import os

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "..", "..", "benchmarks", "results")


def results_path(name: str) -> str:
    os.makedirs(RESULTS_DIR, exist_ok=True)
    return os.path.join(RESULTS_DIR, name)


def append(name: str, text: str) -> None:
    """Append a block of text to benchmarks/results/<name>."""
    with open(results_path(name), "a") as f:
        f.write(text.rstrip() + "\n")


def reset(name: str) -> None:
    """Truncate a results file at the start of a bench session."""
    path = results_path(name)
    if os.path.exists(path):
        os.remove(path)
