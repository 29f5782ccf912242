"""Smoke/shape tests of the per-table harnesses at minuscule scale.

These are integration tests: each harness runs its full pipeline (datasets,
injection, MICE/competitors, timing) end to end; the benchmark jobs reuse
exactly these functions at larger scale factors.
"""
import pytest

from repro.eval import (
    rows_to_markdown,
    table3_learning,
    table4_single_table,
    table5_ncols,
    table6_normalized,
    table7_quality,
    table8_patterns,
)

TINY = 0.0004


@pytest.mark.slow
class TestTable3:
    @pytest.fixture(scope="class")
    def rows(self, spark):
        return table3_learning(spark, sf=TINY, datasets=("flight",))

    def test_all_cells(self, rows):
        assert len(rows) == 6  # 2 attr modes x 3 methods
        assert {r["method"] for r in rows} == {"sql", "ring", "ring+fact"}

    def test_breakdown_populated(self, rows):
        for r in rows:
            assert r["t_cofactor"] > 0
            assert r["t_total"] >= r["t_cofactor"]

    def test_fact_has_no_join_cost(self, rows):
        for r in rows:
            if r["method"] == "ring+fact":
                assert r["t_join"] == 0.0


@pytest.mark.slow
class TestTable4:
    @pytest.fixture(scope="class")
    def rows(self, spark):
        return table4_single_table(
            spark, sf=TINY, rates=(0.2,), datasets=("flight",),
            methods=("baseline", "low", "high", "systemds", "mindsdb"),
        )

    def test_all_cells(self, rows):
        assert len(rows) == 5
        for r in rows:
            assert r["t_iteration"] > 0 and r["t_preprocess"] > 0


@pytest.mark.slow
class TestTable5:
    def test_rows_and_monotone_cols(self, spark):
        rows = table5_ncols(spark, sf=TINY, rates=(0.2,), max_cols=2)
        assert [r["n_cols"] for r in rows] == [1, 2]
        for r in rows:
            assert r["t_global_cofactor"] > 0


@pytest.mark.slow
class TestTable6:
    def test_both_methods(self, spark):
        rows = table6_normalized(spark, sf=0.002, rates=(0.2,),
                                 datasets=("retailer",))
        assert {r["method"] for r in rows} == {"factorized", "materialized"}
        for r in rows:
            assert r["t_iteration"] > 0


@pytest.mark.slow
class TestTable7:
    def test_quality_ordering(self, spark):
        rows = table7_quality(
            spark, sf=0.008, methods=("mice_spark", "mice_python", "mean"),
            mice_iters=2, fast=True,
        )
        by = {r["method"]: r for r in rows}
        assert by["mice_spark"]["rmse"] < by["mean"]["rmse"]
        assert by["mice_python"]["rmse"] < by["mean"]["rmse"]
        assert by["mice_spark"]["r2"] > by["mean"]["r2"]


@pytest.mark.slow
class TestTable8:
    def test_mice_beats_mean(self, spark):
        rows = table8_patterns(
            spark, dataset="flight", sf=TINY, rates=(0.4,), patterns=("MCAR",),
            methods=("mice_spark", "mean"), mice_iters=2,
        )
        by = {r["method"]: r for r in rows}
        assert by["mice_spark"]["nrmse"] < by["mean"]["nrmse"]


def test_rows_to_markdown():
    md = rows_to_markdown([{"a": 1, "b": "x"}])
    assert md.splitlines()[0] == "| a | b |"
    assert "| 1 | x |" in md
    assert rows_to_markdown([]) == "(no rows)"
