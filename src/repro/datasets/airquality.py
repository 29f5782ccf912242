"""Synthetic Taiwan Air Quality dataset (paper dataset 3).

A single table with 11 numerical columns and ~6 % naturally-missing values
in the pollutant columns. The AQI is a (noisy) linear blend of pollutants,
so the paper's quality metric — R²/RMSE of a regression model predicting the
AQI from the (imputed) pollutants — has headroom between mean imputation and
model-based imputation.

``sf=1.0`` ≈ 350k rows (a tenth of the real 3.5M, sized so the NumPy
external-tool baselines finish; the quality comparison is scale-free).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.ring.schema import AttrSchema
from .base import Dataset

POLLUTANTS = ["pm25", "pm10", "o3", "no2", "so2", "co", "nox", "no", "ws", "temp"]
SCHEMA = AttrSchema.of(continuous=["aqi"] + POLLUTANTS)
INCOMPLETE = list(POLLUTANTS)
TARGET = "aqi"
MISSING_RATE = 0.06


def generate(sf: float = 0.01, seed: int = 2) -> Dataset:
    """Generate the single-table Air Quality dataset at scale factor ``sf``."""
    n = max(2000, int(350_000 * sf))
    g = np.random.default_rng(seed)
    traffic = g.gamma(3.0, 1.0, n)
    industry = g.gamma(2.0, 1.0, n)
    sun = g.uniform(0, 1, n)
    ws = g.gamma(2.0, 1.5, n)
    damp = 1.0 / (1.0 + 0.3 * ws)

    no = (8.0 * traffic * damp + g.normal(0, 1.0, n)).clip(0)
    no2 = (12.0 * traffic * damp + 4.0 * industry * damp + g.normal(0, 1.5, n)).clip(0)
    nox = no + no2 + g.normal(0, 0.5, n)
    co = (0.4 * traffic * damp + g.normal(0, 0.05, n)).clip(0)
    so2 = (3.0 * industry * damp + g.normal(0, 0.5, n)).clip(0)
    pm25 = (6.0 * industry * damp + 3.0 * traffic * damp + g.normal(0, 2.0, n)).clip(0)
    pm10 = (1.6 * pm25 + 5.0 * industry * damp + g.normal(0, 3.0, n)).clip(0)
    o3 = (40.0 * sun - 0.8 * no + 20.0 + g.normal(0, 4.0, n)).clip(0)
    temp = 15.0 + 12.0 * sun + g.normal(0, 2.0, n)
    aqi = (
        1.8 * pm25 + 0.5 * pm10 + 0.35 * o3 + 0.6 * no2 + 1.2 * so2
        + 8.0 * co + g.normal(0, 3.0, n)
    ).clip(0)

    table = pd.DataFrame(
        {
            "aqi": aqi.round(2),
            "pm25": pm25.round(2),
            "pm10": pm10.round(2),
            "o3": o3.round(2),
            "no2": no2.round(2),
            "so2": so2.round(2),
            "co": co.round(3),
            "nox": nox.round(2),
            "no": no.round(2),
            "ws": ws.round(2),
            "temp": temp.round(2),
        }
    )
    return Dataset(
        name="airquality",
        tables={"airquality": table},
        fact="airquality",
        schema=SCHEMA,
        incomplete=list(INCOMPLETE),
        target=TARGET,
        join=lambda t: t["airquality"],
    )
