"""Benchmark T4 (Fig. 4): one MICE round per variant/competitor."""
import pytest

from repro.baselines.systemds_like import mice_competitor
from repro.datasets import flight, inject_missing
from repro.mice import run_mice

SF = 0.004
RATE = 0.2


@pytest.fixture(scope="module")
def case(spark):
    ds = flight.generate(sf=SF, seed=0)
    masked, _ = inject_missing(ds.joined(), ds.incomplete, RATE, "MCAR", seed=1)
    sdf = spark.createDataFrame(masked).localCheckpoint(eager=True)
    return dict(ds=ds, sdf=sdf)


@pytest.mark.benchmark(group="t4-mice-round")
@pytest.mark.parametrize("variant", ["baseline", "low", "high"])
def test_table4_ours(benchmark, case, variant):
    ds = case["ds"]
    benchmark.pedantic(
        lambda: run_mice(case["sdf"], ds.schema, ds.incomplete, variant=variant,
                         iters=1, noise=True, seed=0),
        rounds=1, iterations=1,
    )


@pytest.mark.benchmark(group="t4-mice-round")
def test_table4_systemds_like(benchmark, case):
    ds = case["ds"]
    benchmark.pedantic(
        lambda: mice_competitor(case["sdf"], ds.schema, ds.incomplete, iters=1,
                                noise=True, seed=0),
        rounds=1, iterations=1,
    )
