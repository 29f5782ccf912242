"""Micro-benchmark: ring vs scalar-SQL cofactor over one table (Fig. 3 core).

The ring pipeline should beat the scalar-SQL baseline — the paper's 4–6x —
because it runs one pass with a bulk-lifted compound aggregate instead of
``1 + n_cat + C(n_cat, 2)`` aggregation jobs with O(m²) scalar SUMs.
"""
import pytest

from repro import synth_data
from repro.ring import AttrSchema, cofactor_ring, cofactor_sql

SF = 0.05  # ~300k lineitem rows

SCHEMA = AttrSchema.of(
    continuous=["l_quantity", "l_extendedprice", "l_discount", "l_tax"],
    categorical=["l_returnflag", "l_linestatus"],
)


@pytest.fixture(scope="module")
def li(spark):
    df = synth_data.lineitem(spark, sf=SF, seed=0).localCheckpoint(eager=True)
    yield df


@pytest.mark.benchmark(group="cofactor")
def test_cofactor_ring(benchmark, spark, li):
    benchmark.pedantic(lambda: cofactor_ring(li, SCHEMA), rounds=3, iterations=1)


@pytest.mark.benchmark(group="cofactor")
def test_cofactor_sql(benchmark, spark, li):
    benchmark.pedantic(lambda: cofactor_sql(li, SCHEMA), rounds=3, iterations=1)
