"""Benchmark T3 (Fig. 3): learning a regression over the join, per method."""
import pytest

from repro.datasets import flight, retailer
from repro.datasets.plans import flight_plan, retailer_plan
from repro.models import train_ridge
from repro.ring import cofactor_ring, cofactor_sql

SF = 0.01


@pytest.fixture(scope="module")
def cases(spark):
    out = {}
    for name, mod, plan_fn, target in (
        ("flight", flight, flight_plan, "elapsed_time"),
        ("retailer", retailer, retailer_plan, "inventoryunits"),
    ):
        ds = mod.generate(sf=SF, seed=0)
        joined = spark.createDataFrame(ds.joined()).localCheckpoint(eager=True)
        fact = spark.createDataFrame(ds.tables[ds.fact]).localCheckpoint(eager=True)
        out[name] = dict(ds=ds, joined=joined, fact=fact,
                         plan=plan_fn(spark, ds), target=target)
    return out


@pytest.mark.benchmark(group="t3-learning")
@pytest.mark.parametrize("name", ["flight", "retailer"])
@pytest.mark.parametrize("method", ["sql", "ring", "ring+fact"])
def test_table3(benchmark, cases, name, method):
    c = cases[name]
    schema = c["ds"].schema

    def run():
        if method == "ring+fact":
            t = c["plan"].cofactor(c["fact"])
        elif method == "ring":
            t = cofactor_ring(c["joined"], schema)
        else:
            t = cofactor_sql(c["joined"], schema)
        return train_ridge(t, c["target"], l2=1e-3)

    benchmark.pedantic(run, rounds=2, iterations=1)
