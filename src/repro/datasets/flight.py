"""Synthetic Flight Delays & Cancellations dataset (paper dataset 1).

Shape mirrors the real dataset where it matters for the experiments:

* 3 tables — a wide fact (``flights``) holding most attributes, plus two
  small dimensions (``routes``, ``airlines``), so joining adds little
  redundancy and factorized evaluation does *not* pay off (Sections 6.1/6.3).
* 7 imputable columns: 6 continuous + 1 categorical (``diverted``), with
  linear structure among them so MICE has signal to recover.
* downstream task: predict flight duration (``elapsed_time``) from the
  (imputed) predictors — the paper's Figure 1/8 quality metric.

``sf=1.0`` ≈ the paper's restricted Flight dataset (5M rows); tests use
``sf<=0.01`` and benchmarks ``sf~0.1``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.ring.schema import AttrSchema
from .base import Dataset

#: analysis attributes of the joined view
SCHEMA = AttrSchema.of(
    continuous=[
        "distance",
        "dep_hour",
        "dep_delay",
        "taxi_out",
        "taxi_in",
        "airtime",
        "arr_delay",
        "sched_time",
        "elapsed_time",
        "base_dist",
        "origin_pop",
        "fleet_age",
        "otp_score",
    ],
    categorical=["diverted"],
)

#: columns the imputation experiments mask (6 continuous + 1 categorical)
INCOMPLETE = ["distance", "airtime", "taxi_out", "dep_delay", "arr_delay",
              "sched_time", "diverted"]
TARGET = "elapsed_time"
FACT_ATTRS = ["distance", "dep_hour", "dep_delay", "taxi_out", "taxi_in",
              "airtime", "arr_delay", "sched_time", "elapsed_time", "diverted"]
ROUTE_ATTRS = ["base_dist", "origin_pop"]
AIRLINE_ATTRS = ["fleet_age", "otp_score"]


def _join(tables: dict[str, pd.DataFrame]) -> pd.DataFrame:
    return (
        tables["flights"]
        .merge(tables["routes"], on="route_id")
        .merge(tables["airlines"], on="airline_id")
    )


def generate(sf: float = 0.01, seed: int = 0) -> Dataset:
    """Generate the 3-table Flight dataset at scale factor ``sf``."""
    n = max(500, int(5_000_000 * sf))
    n_routes = max(20, n // 50)
    n_airlines = 30
    g = np.random.default_rng(seed)

    routes = pd.DataFrame(
        {
            "route_id": np.arange(n_routes),
            "base_dist": (g.gamma(3.0, 300.0, n_routes) + 100).round(1),
            "origin_pop": (g.lognormal(13.0, 1.0, n_routes) / 1e4).round(2),
        }
    )
    airlines = pd.DataFrame(
        {
            "airline_id": np.arange(n_airlines),
            "fleet_age": (g.uniform(2, 25, n_airlines)).round(2),
            "otp_score": (g.uniform(0.6, 0.95, n_airlines)).round(4),
        }
    )

    route_id = g.integers(0, n_routes, n)
    airline_id = g.integers(0, n_airlines, n)
    base = routes["base_dist"].to_numpy()[route_id]
    otp = airlines["otp_score"].to_numpy()[airline_id]
    distance = base * (1.0 + 0.05 * g.normal(size=n))
    dep_hour = g.uniform(5, 23, n)
    airtime = distance / 8.0 + 15.0 + 4.0 * g.normal(size=n)
    taxi_out = 12.0 + 2.0 * (dep_hour > 15) * (dep_hour - 15) + 3.0 * g.normal(size=n)
    taxi_in = 6.0 + 2.0 * g.normal(size=n)
    # delays: worse at peak hours and for low-OTP carriers
    dep_delay = np.maximum(
        -10.0,
        g.exponential(12.0, n) * (1.6 - otp) + 1.5 * (dep_hour - 12) - 5.0
        + 5.0 * g.normal(size=n),
    )
    elapsed_time = airtime + taxi_out + taxi_in + 2.0 * g.normal(size=n)
    arr_delay = dep_delay + 0.15 * taxi_out + 3.0 * g.normal(size=n) - 3.0
    sched_time = elapsed_time - 0.2 * dep_delay + 5.0 * g.normal(size=n)
    diverted = (
        (airtime / np.maximum(airtime.mean(), 1e-9) + 0.8 * g.normal(size=n)) > 2.2
    ).astype(np.int64)

    flights = pd.DataFrame(
        {
            "flight_id": np.arange(n),
            "route_id": route_id,
            "airline_id": airline_id,
            "distance": distance.round(2),
            "dep_hour": dep_hour.round(2),
            "dep_delay": dep_delay.round(2),
            "taxi_out": taxi_out.round(2),
            "taxi_in": taxi_in.round(2),
            "airtime": airtime.round(2),
            "arr_delay": arr_delay.round(2),
            "sched_time": sched_time.round(2),
            "elapsed_time": elapsed_time.round(2),
            "diverted": diverted,
        }
    )
    return Dataset(
        name="flight",
        tables={"flights": flights, "routes": routes, "airlines": airlines},
        fact="flights",
        schema=SCHEMA,
        incomplete=list(INCOMPLETE),
        target=TARGET,
        join=_join,
    )
