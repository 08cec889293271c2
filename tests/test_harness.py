"""Harness + table builders produce well-formed rows at test scale."""
import numpy as np
import pytest

from repro.evalharness import runner, tables
from repro.graphs import generators as gen

from .conftest import exact_bc, graph


@pytest.fixture(scope="module")
def small_barbell():
    return gen.barbell(8)


class TestRunnerPieces:
    def test_dependency_column(self, spark):
        key = "er30"
        col = runner.dependency_column(spark, graph(key), 0)
        from .conftest import dep_column

        assert np.allclose(col, dep_column(key, 0))

    def test_dataset_row_fields(self, spark, small_barbell):
        row = runner.dataset_row(spark, small_barbell, diam_sources=8)
        assert row["n"] == 17 and row["m"] == small_barbell.m
        assert row["diameter>="] >= 3 and row["exact_bc_secs"] > 0

    def test_mu_row_separator(self, spark, small_barbell):
        row = runner.mu_row(spark, small_barbell, 8, "separator")
        assert row["mu"] == pytest.approx(17 / 16, abs=1e-3)
        assert row["eq14_T(eps=.05,delta=.1)"] > 0

    def test_single_accuracy_rows(self, spark, small_barbell):
        rows = runner.single_accuracy_rows(
            spark, small_barbell, 8, "separator", [200, 800], n_chains=4
        )
        assert len(rows) == 2
        for row in rows:
            assert row["nbc_exact"] > 0
            assert 1.0 - 0.2 <= row["bias_factor"] <= row["mu"] + 0.2

    def test_coverage_row_meets_delta(self, spark, small_barbell):
        row = runner.coverage_row(
            spark, small_barbell, 8, "separator", n_chains=15
        )
        # Theorem 1 regime (μ≈1): empirical failure must respect δ.
        assert row["fail_rate_vs_limit"] <= row["delta"]
        assert row["eq14_T"] > 0

    def test_baseline_rows_all_methods(self, spark, small_barbell):
        rows = runner.baseline_rows(
            spark, small_barbell, 8, "separator", 150, n_reps=3
        )
        assert {r["method"] for r in rows} == {
            "mh (this paper)",
            "uniform-source [2]",
            "distance [13]",
            "rk paths [30]",
        }

    def test_joint_rows(self, spark, small_barbell):
        rows = runner.joint_rows(
            spark, small_barbell, [8, 7, 0], [400], n_chains=3
        )
        assert rows, "no pairs produced"
        for row in rows:
            assert row["exact_ratio"] > 0
            assert np.isfinite(row["est_ratio"])

    def test_runtime_row(self, spark):
        row = runner.runtime_row(spark, gen.barabasi_albert(80, 2, seed=1), 60)
        assert row["mh_secs"] > 0 and row["exact_secs"] > 0
        assert row["distinct_scored"] <= 80


class TestTableBuilders:
    def test_bench_suite_sizes(self):
        for g in tables.bench_suite("test"):
            assert g.n <= 200
        names = [g.name.split("-")[0] for g in tables.bench_suite("bench")]
        assert "ba" in names and "barbell" in names

    def test_roles_for_labels(self, spark):
        roles = tables.roles_for(spark, graph("barbell5"))
        kinds = {role for _, role in roles}
        assert "separator" in kinds

    def test_roles_for_nonseparator_graph(self, spark):
        roles = tables.roles_for(spark, graph("er30"))
        kinds = {role for _, role in roles}
        assert "max-bc" in kinds

    def test_table1_test_scale(self, spark):
        df = tables.table1(spark, "test")
        assert len(df) == len(tables.bench_suite("test"))
        assert {"graph", "n", "m", "exact_bc_secs"} <= set(df.columns)

    def test_render(self, spark):
        import pandas as pd

        out = tables.render(pd.DataFrame([{"a": 1}]), "T0")
        assert "T0" in out and "a" in out
