"""Synthetic Retailer dataset (paper dataset 2): a 5-table snowflake.

Shape mirrors the properties the experiments depend on:

* narrow fact ``inventory(locn, dateid, ksn, inventoryunits)`` — only one
  analysis attribute, like the real Retailer — joined to wide dimensions
  (``location`` → ``census`` snowflake, ``item``, ``weather``) whose rows are
  <3 % of the fact, so the joined view is highly redundant and factorized
  evaluation pays off (Sections 6.1/6.3);
* 7 imputable columns on the joined view (6 continuous + 1 categorical) for
  the quality experiments; the fact-only experiments mask ``inventoryunits``;
* downstream task: predict inventory stock from (imputed) predictors.

``sf=1.0`` ≈ the paper's restricted Retailer (1M rows).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.ring.schema import AttrSchema
from .base import Dataset

SCHEMA = AttrSchema.of(
    continuous=[
        "inventoryunits",
        "tot_area",
        "sell_area",
        "avghhi",
        "population",
        "medianage",
        "households",
        "prize",
        "maxtemp",
        "mintemp",
    ],
    categorical=["rgn_cd", "subcategory", "category", "rain"],
)

INCOMPLETE = ["population", "medianage", "avghhi", "prize", "maxtemp",
              "sell_area", "subcategory"]
#: single incomplete attribute for the fact-only (normalized) experiments
FACT_INCOMPLETE = ["inventoryunits"]
TARGET = "inventoryunits"
FACT_ATTRS = ["inventoryunits"]
LOCATION_ATTRS = ["tot_area", "sell_area", "avghhi", "rgn_cd"]
CENSUS_ATTRS = ["population", "medianage", "households"]
ITEM_ATTRS = ["prize", "subcategory", "category"]
WEATHER_ATTRS = ["maxtemp", "mintemp", "rain"]


def _join(tables: dict[str, pd.DataFrame]) -> pd.DataFrame:
    return (
        tables["inventory"]
        .merge(tables["location"], on="locn")
        .merge(tables["census"], on="zip")
        .merge(tables["item"], on="ksn")
        .merge(tables["weather"], on=["locn", "dateid"])
    )


def generate(sf: float = 0.01, seed: int = 1) -> Dataset:
    """Generate the 5-table Retailer snowflake at scale factor ``sf``."""
    n = max(1000, int(1_000_000 * sf))
    n_loc = max(8, n // 2000)
    n_zip = max(4, n_loc // 2)
    n_item = max(20, n // 500)
    n_date = max(10, min(90, n // 1000))
    g = np.random.default_rng(seed)

    location = pd.DataFrame(
        {
            "locn": np.arange(n_loc),
            "zip": g.integers(0, n_zip, n_loc),
            "tot_area": (g.uniform(20, 200, n_loc) * 1000).round(0),
            "sell_area": (g.uniform(10, 100, n_loc) * 1000).round(0),
            "avghhi": (g.normal(65, 20, n_loc) * 1000).clip(15000).round(0),
            "rgn_cd": g.integers(0, 4, n_loc),
        }
    )
    census = pd.DataFrame(
        {
            "zip": np.arange(n_zip),
            "population": (g.lognormal(10.5, 0.8, n_zip)).round(0),
            "medianage": g.uniform(25, 55, n_zip).round(1),
            "households": (g.lognormal(9.4, 0.8, n_zip)).round(0),
        }
    )
    item = pd.DataFrame(
        {
            "ksn": np.arange(n_item),
            "prize": (g.gamma(2.0, 15.0, n_item) + 1).round(2),
            "subcategory": g.integers(0, 8, n_item),
            "category": g.integers(0, 3, n_item),
        }
    )
    locs = np.repeat(np.arange(n_loc), n_date)
    dates = np.tile(np.arange(n_date), n_loc)
    season = 18.0 + 10.0 * np.sin(2 * np.pi * dates / max(n_date, 1))
    maxt = season + 6.0 + 2.0 * g.normal(size=len(locs))
    weather = pd.DataFrame(
        {
            "locn": locs,
            "dateid": dates,
            "maxtemp": maxt.round(1),
            "mintemp": (maxt - g.uniform(4, 12, len(locs))).round(1),
            "rain": (g.random(len(locs)) < 0.25).astype(np.int64),
        }
    )

    locn = g.integers(0, n_loc, n)
    dateid = g.integers(0, n_date, n)
    ksn = g.integers(0, n_item, n)
    zipc = location["zip"].to_numpy()[locn]
    pop = census["population"].to_numpy()[zipc]
    prize = item["prize"].to_numpy()[ksn]
    wmap = {(l, d): t for l, d, t in zip(weather["locn"], weather["dateid"], weather["maxtemp"])}
    temp = np.fromiter((wmap[(l, d)] for l, d in zip(locn, dateid)), dtype=float, count=n)
    inventoryunits = (
        0.0008 * pop
        - 0.8 * prize
        + 1.5 * temp
        + 10.0 * g.normal(size=n)
        + 40.0
    ).round(2)

    inventory = pd.DataFrame(
        {
            "locn": locn,
            "dateid": dateid,
            "ksn": ksn,
            "inventoryunits": inventoryunits,
        }
    )
    return Dataset(
        name="retailer",
        tables={
            "inventory": inventory,
            "location": location,
            "census": census,
            "item": item,
            "weather": weather,
        },
        fact="inventory",
        schema=SCHEMA,
        incomplete=list(INCOMPLETE),
        target=TARGET,
        join=_join,
    )
