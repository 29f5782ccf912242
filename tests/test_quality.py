"""Downstream-quality metric (the paper's R²/RMSE evaluation protocol)."""
import numpy as np
import pytest

from repro.datasets import airquality, inject_missing
from repro.eval.quality import downstream_quality, normalized_rmse, split_train_test


@pytest.fixture(scope="module")
def aq():
    ds = airquality.generate(sf=0.01, seed=5)
    train, test = split_train_test(ds.joined(), seed=0)
    return dict(ds=ds, train=train, test=test)


class TestSplit:
    def test_split_fractions(self, aq):
        n = len(aq["train"]) + len(aq["test"])
        assert abs(len(aq["test"]) / n - 0.2) < 0.03

    def test_split_deterministic(self, aq):
        t1, s1 = split_train_test(aq["ds"].joined(), seed=0)
        assert t1.equals(aq["train"]) and s1.equals(aq["test"])

    def test_split_disjoint_cover(self, aq):
        n = len(aq["ds"].joined())
        assert len(aq["train"]) + len(aq["test"]) == n


class TestDownstream:
    def test_clean_data_high_r2(self, aq):
        ds = aq["ds"]
        q = downstream_quality(aq["train"], aq["test"], ds.schema, ds.target)
        assert q["r2"] > 0.95
        assert q["rmse"] > 0

    def test_mean_imputation_degrades_quality(self, aq):
        ds = aq["ds"]
        masked, _ = inject_missing(aq["train"], ds.incomplete, 0.3, "MCAR", seed=1)
        filled = masked.copy()
        for c in ds.incomplete:
            filled[c] = filled[c].fillna(filled[c].mean())
        q_clean = downstream_quality(aq["train"], aq["test"], ds.schema, ds.target)
        q_mean = downstream_quality(filled, aq["test"], ds.schema, ds.target)
        assert q_mean["rmse"] > q_clean["rmse"]
        assert q_mean["r2"] < q_clean["r2"]

    def test_normalized_rmse_scale_free(self, aq):
        ds = aq["ds"]
        nr = normalized_rmse(aq["train"], aq["test"], ds.schema, ds.target)
        assert 0 < nr < 0.5  # clean fit: far below 1 (= predicting the mean)
