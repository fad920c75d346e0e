"""Benchmark-session setup: truncate results files so each run's
benchmarks/results/ reflects exactly one session."""
import pytest

from repro.harness import report

_RESULT_FILES = (
    "table5.txt",
    "table6.txt",
    "table6_spark.txt",
    "table7.txt",
    "table7_spark.txt",
    "compression_ratios.txt",
)


@pytest.fixture(scope="session", autouse=True)
def _fresh_results():
    for name in _RESULT_FILES:
        report.reset(name)
    yield
