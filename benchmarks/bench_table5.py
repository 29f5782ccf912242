"""Benchmark T5 (Fig. 5): Low-variant round vs number of incomplete columns."""
import pytest

from repro.datasets import flight, inject_missing
from repro.mice import run_mice

SF = 0.004


@pytest.fixture(scope="module")
def ds(spark):
    return flight.generate(sf=SF, seed=0)


@pytest.mark.benchmark(group="t5-ncols")
@pytest.mark.parametrize("ncols", [1, 3, 6])
def test_table5(benchmark, spark, ds, ncols):
    cols = [a for a in ds.incomplete if a != "diverted"][:ncols]
    masked, _ = inject_missing(ds.joined(), cols, 0.05, "MCAR", seed=2)
    sdf = spark.createDataFrame(masked).localCheckpoint(eager=True)
    benchmark.pedantic(
        lambda: run_mice(sdf, ds.schema, cols, variant="low", iters=1,
                         noise=True, seed=0),
        rounds=1, iterations=1,
    )
