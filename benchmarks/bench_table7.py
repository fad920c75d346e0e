"""Benchmark target regenerating Table 7 (MGD runtimes, Census/Kdd99).

Same structure as bench_table6; scales follow the paper's Appendix D.2
(Census 15m/290m, Kdd99 7m/200m).
"""
import pytest

from repro.harness import mgd_runtime as engine
from repro.harness import table7

CELLS = [
    (dataset, scale_name, model)
    for dataset in table7.DATASETS
    for scale_name in table7.SCALES[dataset]
    for model in engine.MODELS
]


@pytest.mark.benchmark(group="table7")
@pytest.mark.parametrize("dataset,scale_name,model", CELLS)
def test_table7_cell(benchmark, dataset, scale_name, model):
    virtual = table7.SCALES[dataset][scale_name]

    def run():
        return [
            engine.run_cell(
                dataset,
                model,
                method,
                virtual_rows=virtual,
                scale_name=scale_name,
                actual_rows=1000,
                epochs_measured=2,
            )
            for method in engine.LOCAL_METHODS
        ]

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    paper = table7.PAPER[(dataset, scale_name)]
    lines = [f"[table7 {dataset} {scale_name} {model}]"]
    for r in rows:
        benchmark.extra_info[r.method] = {
            "measured_min": round(r.total_min, 2),
            "paper_min": paper[r.method][model],
            "fits": r.fits_in_memory,
        }
        lines.append(
            f"  {r.method:8s} measured={r.total_min:9.2f} min "
            f"(compute={r.compute_min:8.2f} io={r.io_min:7.2f}) "
            f"paper={paper[r.method][model]!s:>6s} fits={r.fits_in_memory} "
            f"ratio={r.compression_ratio:.1f}"
        )
    from repro.harness import report

    report.append("table7.txt", "\n".join(lines))
    print("\n" + "\n".join(lines))


@pytest.mark.benchmark(group="table7-spark")
@pytest.mark.parametrize("dataset", table7.DATASETS)
def test_table7_spark_rows(benchmark, spark, dataset):
    def run():
        out = []
        for scale_name, virtual in table7.SCALES[dataset].items():
            for method in ("TOC", "DEN", "CSR"):
                out.append(
                    engine.run_spark_cell(
                        spark,
                        dataset,
                        "LR",
                        method,
                        virtual_rows=virtual,
                        scale_name=scale_name,
                        actual_rows=1000,
                    )
                )
        return out

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    from repro.harness import report

    text = f"[table7 spark rows {dataset} LR]\n" + engine.format_rows(rows)
    report.append("table7_spark.txt", text)
    print("\n" + text)
