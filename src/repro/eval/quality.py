"""Imputation-quality metric (Figures 1, 7, 8).

As in the paper: train a linear regression model *on the imputed dataset*
to predict the downstream target (flight duration / inventory stock / AQI),
then measure RMSE and R² of that model on held-out clean data. Training
reuses our own triple-based ridge trainer (driver-side bulk lift), so a
quality regression in the imputation pipeline shows up directly here.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.models import train_ridge
from repro.ring.schema import AttrSchema
from repro.ring.triple import lift_block


def split_train_test(pdf: pd.DataFrame, test_frac: float = 0.2, seed: int = 0):
    """Deterministic row split; missingness is injected into train only."""
    g = np.random.default_rng(seed)
    test_mask = g.random(len(pdf)) < test_frac
    return (
        pdf[~test_mask].reset_index(drop=True),
        pdf[test_mask].reset_index(drop=True),
    )


def downstream_quality(
    imputed: pd.DataFrame,
    test: pd.DataFrame,
    schema: AttrSchema,
    target: str,
    *,
    l2: float = 1e-6,
) -> dict:
    """RMSE / R² of a ridge model trained on ``imputed``, scored on ``test``."""
    cols = list(schema.names)
    triple = lift_block(imputed[cols], schema)
    model = train_ridge(triple, target, l2=l2)
    pred = model.predict_np(test)
    y = test[target].to_numpy(dtype=float)
    rmse = float(np.sqrt(((pred - y) ** 2).mean()))
    ss_res = float(((pred - y) ** 2).sum())
    ss_tot = float(((y - y.mean()) ** 2).sum())
    r2 = 1.0 - ss_res / max(ss_tot, 1e-12)
    return {"rmse": rmse, "r2": r2}


def normalized_rmse(imputed: pd.DataFrame, test: pd.DataFrame,
                    schema: AttrSchema, target: str, **kw) -> float:
    """RMSE scaled by the test-set target std — comparable across datasets
    (the paper's Figure-8 RMSEs are in this normalized regime)."""
    q = downstream_quality(imputed, test, schema, target, **kw)
    return q["rmse"] / float(test[target].std())
