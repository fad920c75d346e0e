"""Harness tests: table engines produce well-formed rows, paper constants
are complete, and the scale model produces the paper's qualitative shape."""
import numpy as np
import pytest

from repro.harness import mgd_runtime as engine
from repro.harness import table5, table6, table7


class TestTable5:
    def test_rows_cover_all_datasets(self):
        rows = table5.rows(sample_rows=200)
        assert {r["dataset"] for r in rows} == set(table5.PAPER)

    def test_extrapolated_sizes_positive(self):
        for r in table5.rows(sample_rows=200):
            assert r["extrapolated_den_gb"] > 0
            assert r["paper_size_gb"] > 0

    def test_sparsity_close_to_paper_for_moderate(self):
        rows = {r["dataset"]: r for r in table5.rows(sample_rows=500)}
        for name in ("census", "imagenet", "mnist", "kdd99"):
            assert rows[name]["sparsity"] == pytest.approx(
                rows[name]["paper_sparsity"], rel=0.2
            )

    def test_format_table_renders(self):
        text = table5.format_table(table5.rows(sample_rows=100))
        assert "census" in text and "paper GB" in text


class TestPaperConstants:
    def test_table6_grid_complete(self):
        for key, methods in table6.PAPER.items():
            assert set(methods) == {
                "TOC", "DEN", "CSR", "CVI", "DVI", "Snappy", "Gzip",
                "SparkTOC", "SparkDEN", "SparkCSR",
            }, key
            for m, vals in methods.items():
                assert set(vals) == {"NN", "LR", "SVM"}

    def test_table7_grid_complete(self):
        assert set(table7.PAPER) == {
            ("census", "15m"), ("census", "290m"), ("kdd99", "7m"), ("kdd99", "200m"),
        }

    def test_paper_headline_speedups_present(self):
        # §5.3: TOC up to 5.6x faster than the best alternative for LR on
        # Imagenet25m, and BismarckTOC 10.2x vs the best other system.
        t6 = table6.PAPER[("imagenet", "25m")]
        best_other = min(
            v["LR"] for k, v in t6.items() if k not in ("TOC", "SparkTOC") and v["LR"]
        )
        assert best_other / t6["TOC"]["LR"] == pytest.approx(5.6, abs=0.1)

    def test_nn_na_for_non_toc_bismarck_rows(self):
        for key in table6.PAPER:
            assert table6.PAPER[key]["SparkDEN"]["NN"] is None
            assert table6.PAPER[key]["SparkCSR"]["NN"] is None


class TestEngine:
    @pytest.fixture(scope="class")
    def small_cells(self):
        # Census's paper scales: 15m (7 GB, everything fits the 15 GB
        # machine) and 290m (140 GB, only high-ratio formats fit).
        cells = {}
        for method in ("TOC", "DEN", "CSR"):
            for scale_name, virtual in (("15m", 15_000_000), ("290m", 290_000_000)):
                cells[(method, scale_name)] = engine.run_cell(
                    "census",
                    "LR",
                    method,
                    virtual_rows=virtual,
                    scale_name=scale_name,
                    actual_rows=400,
                    epochs_measured=2,
                )
        return cells

    def test_row_fields(self, small_cells):
        r = small_cells[("TOC", "15m")]
        d = r.as_dict()
        assert d["dataset"] == "census" and d["model"] == "LR" and d["method"] == "TOC"
        assert d["total_min"] == pytest.approx(d["compute_min"] + d["io_min"])
        assert d["measured_compute_s"] > 0

    def test_small_scale_everything_fits(self, small_cells):
        for method in ("TOC", "DEN", "CSR"):
            assert small_cells[(method, "15m")].fits_in_memory, method

    def test_large_scale_only_compressed_fits(self, small_cells):
        # The Table-6 mechanism: TOC fits at 25m; DEN and CSR spill.
        assert small_cells[("TOC", "290m")].fits_in_memory
        assert not small_cells[("DEN", "290m")].fits_in_memory
        assert not small_cells[("CSR", "290m")].fits_in_memory

    def test_spilled_methods_pay_epoch_io(self, small_cells):
        assert small_cells[("DEN", "290m")].io_min > 10 * small_cells[("TOC", "290m")].io_min

    def test_toc_wins_at_large_scale(self, small_cells):
        # The headline shape: TOC fastest end-to-end at 25m-row scale.
        toc = small_cells[("TOC", "290m")].total_min
        assert toc < small_cells[("DEN", "290m")].total_min
        assert toc < small_cells[("CSR", "290m")].total_min

    def test_compression_ratios_sane(self, small_cells):
        assert small_cells[("TOC", "15m")].compression_ratio > 10
        assert small_cells[("DEN", "15m")].compression_ratio == pytest.approx(1.0, abs=0.01)

    def test_format_rows_renders(self, small_cells):
        text = engine.format_rows(list(small_cells.values()))
        assert "census" in text and "total_min" in text


class TestEngineSpark:
    def test_spark_cell_runs(self, spark):
        r = engine.run_spark_cell(
            spark,
            "census",
            "LR",
            "TOC",
            virtual_rows=1_000_000,
            scale_name="1m",
            actual_rows=300,
        )
        assert r.method == "SparkTOC"
        assert r.total_min > 0
        assert r.fits_in_memory
