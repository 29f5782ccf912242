"""Benchmark T8 (Fig. 8): one quality cell per pattern (MICE Spark, 20%)."""
import pytest

from repro.datasets import flight, inject_missing
from repro.eval.quality import split_train_test
from repro.mice import run_mice

SF = 0.001


@pytest.fixture(scope="module")
def case(spark):
    ds = flight.generate(sf=SF, seed=0)
    train, _ = split_train_test(ds.joined(), seed=0)
    return dict(ds=ds, train=train)


@pytest.mark.benchmark(group="t8-patterns")
@pytest.mark.parametrize("pattern", ["MCAR", "MAR", "MNAR"])
def test_t8_mice_spark(benchmark, spark, case, pattern):
    ds = case["ds"]
    masked, _ = inject_missing(
        case["train"], ds.incomplete, 0.2, pattern,
        depends_on=ds.target if pattern == "MAR" else None, seed=5,
    )
    sdf = spark.createDataFrame(masked).localCheckpoint(eager=True)
    benchmark.pedantic(
        lambda: run_mice(sdf, ds.schema, ds.incomplete, variant="low", iters=2,
                         noise=True, seed=0),
        rounds=1, iterations=1,
    )
