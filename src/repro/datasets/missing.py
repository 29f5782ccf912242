"""Missing-value injection: MCAR, MAR, MNAR (Section 6.4 / HyperImpute-style).

All mechanisms operate on a pandas frame (datasets are generated driver-side
like the provided TPC-H-lite module) and return the frame with NaNs for
continuous columns / pandas NA for categorical ones, plus the boolean mask
(True = missing). The ground truth is the caller's original frame.

* MCAR  — each cell of each target column is masked i.i.d. with prob ``rate``.
* MAR   — the masking probability of every target column depends on the value
  of a fully-observed driver column: rows with larger driver values are more
  likely to lose data (probability ∝ rank^k, rescaled to the target rate).
* MNAR  — the masking probability of each target column depends on that
  column's *own* (about-to-be-hidden) values, same rank-based scaling.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

_MECHANISMS = ("MCAR", "MAR", "MNAR")


def _rank_probs(values: np.ndarray, rate: float, k: float = 2.0) -> np.ndarray:
    """Per-row masking probabilities ∝ rank(values)^k with mean ``rate``."""
    order = np.argsort(np.argsort(values, kind="stable"), kind="stable")
    w = ((order + 1) / len(values)) ** k
    p = rate * w / w.mean()
    return np.clip(p, 0.0, 0.95)


def inject_missing(
    pdf: pd.DataFrame,
    columns: list[str],
    rate: float,
    mechanism: str = "MCAR",
    *,
    depends_on: str | None = None,
    seed: int = 0,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Mask ``rate`` of each target column under the given mechanism.

    Returns ``(incomplete, mask)`` where ``mask[c]`` is True where ``c`` was
    masked. ``depends_on`` names the observed driver column for MAR.
    """
    if mechanism not in _MECHANISMS:
        raise ValueError(f"mechanism must be one of {_MECHANISMS}")
    if not 0.0 <= rate < 1.0:
        raise ValueError(f"rate must be in [0, 1): {rate}")
    if mechanism == "MAR":
        if depends_on is None:
            raise ValueError("MAR requires depends_on")
        if depends_on in columns:
            raise ValueError("MAR driver column must stay fully observed")
    g = np.random.default_rng(seed)
    out = pdf.copy()
    mask = pd.DataFrame(False, index=pdf.index, columns=columns)
    for c in columns:
        if mechanism == "MCAR":
            p = np.full(len(pdf), rate)
        elif mechanism == "MAR":
            p = _rank_probs(pdf[depends_on].to_numpy(dtype=float), rate)
        else:  # MNAR: depends on the column's own values
            vals = pdf[c]
            vals = (
                vals.astype("category").cat.codes.to_numpy(dtype=float)
                if not pd.api.types.is_numeric_dtype(vals)
                else vals.to_numpy(dtype=float)
            )
            p = _rank_probs(vals, rate)
        m = g.random(len(pdf)) < p
        mask[c] = m
        if pd.api.types.is_float_dtype(out[c]):
            out.loc[m, c] = np.nan
        elif pd.api.types.is_integer_dtype(out[c]):
            out[c] = out[c].astype("Int64")
            out.loc[m, c] = pd.NA
        else:
            out[c] = out[c].astype("object")
            out.loc[m, c] = None
    return out, mask
