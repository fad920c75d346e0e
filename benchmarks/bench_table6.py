"""Benchmark target regenerating Table 6 (MGD runtimes, Imagenet/Mnist).

One benchmark per (dataset, scale, model): the timed body runs every
local method's cell through the shared engine and prints the resulting
table rows (virtual-scale minutes) next to the paper's numbers. A
separate benchmark covers the Spark-integration rows (LR only, the
paper's headline comparison).
"""
import pytest

from repro.harness import mgd_runtime as engine
from repro.harness import table6

CELLS = [
    (dataset, scale_name, model)
    for dataset in table6.DATASETS
    for scale_name in table6.SCALES
    for model in engine.MODELS
]


@pytest.mark.benchmark(group="table6")
@pytest.mark.parametrize("dataset,scale_name,model", CELLS)
def test_table6_cell(benchmark, dataset, scale_name, model):
    virtual = table6.SCALES[scale_name]

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
    paper = table6.PAPER[(dataset, scale_name)]
    lines = [f"[table6 {dataset} {scale_name} {model}]"]
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

    report.append("table6.txt", "\n".join(lines))
    print("\n" + "\n".join(lines))


@pytest.mark.benchmark(group="table6-spark")
@pytest.mark.parametrize("dataset", table6.DATASETS)
def test_table6_spark_rows(benchmark, spark, dataset):
    def run():
        out = []
        for scale_name, virtual in table6.SCALES.items():
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

    text = f"[table6 spark rows {dataset} LR]\n" + engine.format_rows(rows)
    report.append("table6_spark.txt", text)
    print("\n" + text)
