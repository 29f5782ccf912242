"""Benchmark T7 (Fig. 7): imputation time per method on Air Quality."""
import pytest

from repro.baselines import gain, mice_python, midas, miracle
from repro.baselines import forest as forest_mod
from repro.datasets import airquality, inject_missing
from repro.mice import run_mice

SF = 0.01


@pytest.fixture(scope="module")
def case(spark):
    ds = airquality.generate(sf=SF, seed=0)
    masked, _ = inject_missing(ds.joined(), ds.incomplete,
                               airquality.MISSING_RATE, "MCAR", seed=4)
    sdf = spark.createDataFrame(masked).localCheckpoint(eager=True)
    return dict(ds=ds, masked=masked, sdf=sdf)


@pytest.mark.benchmark(group="t7-quality-time")
def test_t7_mice_spark(benchmark, case):
    ds = case["ds"]
    benchmark.pedantic(
        lambda: run_mice(case["sdf"], ds.schema, ds.incomplete, variant="low",
                         iters=2, noise=True, seed=0),
        rounds=1, iterations=1,
    )


@pytest.mark.benchmark(group="t7-quality-time")
def test_t7_mean(benchmark, case):
    ds = case["ds"]

    def run():
        out = case["masked"].copy()
        for c in ds.incomplete:
            out[c] = out[c].fillna(out[c].mean())
        return out

    benchmark.pedantic(run, rounds=3, iterations=1)


@pytest.mark.benchmark(group="t7-quality-time")
@pytest.mark.parametrize(
    "method,fn,kw",
    [
        ("mice_python", mice_python.impute, dict(iters=2, noise=False)),
        ("missforest", forest_mod.impute, dict(iters=1, n_trees=4, max_depth=6)),
        ("gain", gain.impute, dict(iterations=300)),
        ("miracle", miracle.impute, dict(epochs=5, ista_iters=60)),
        ("midaspy", midas.impute, dict(epochs=10)),
    ],
)
def test_t7_numpy_methods(benchmark, case, method, fn, kw):
    ds = case["ds"]
    benchmark.pedantic(
        lambda: fn(case["masked"], ds.incomplete, set(), seed=0, **kw),
        rounds=1, iterations=1,
    )
