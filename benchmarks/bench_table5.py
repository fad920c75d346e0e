"""Benchmark target for Table 5: dataset statistics on all surrogates.

Regenerates the measured Table 5 rows (printed at the end of the bench
run) and times the stats computation itself.
"""
import pytest

from repro.harness import table5


@pytest.mark.benchmark(group="table5")
def test_table5_dataset_stats(benchmark):
    rows = benchmark.pedantic(table5.rows, kwargs={"sample_rows": 500}, rounds=2, iterations=1)
    assert {r["dataset"] for r in rows} == set(table5.PAPER)
    from repro.harness import report

    text = table5.format_table(rows)
    report.append("table5.txt", text)
    print("\n" + text)
