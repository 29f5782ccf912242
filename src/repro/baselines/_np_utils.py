"""Small NumPy helpers shared by the external-tool-class imputers."""
from __future__ import annotations

import numpy as np
import pandas as pd


def to_matrix(pdf: pd.DataFrame, columns: list[str], cat_cols: set[str]):
    """Frame → float matrix with categorical codes; returns decode info."""
    mats, decoders = [], {}
    for c in columns:
        if c in cat_cols:
            cats = pd.Categorical(pdf[c])
            codes = cats.codes.astype(float)
            codes[codes < 0] = np.nan
            mats.append(codes)
            decoders[c] = list(cats.categories)
        else:
            mats.append(pdf[c].to_numpy(dtype=float))
    return np.column_stack(mats), decoders


def from_matrix(x: np.ndarray, pdf: pd.DataFrame, columns: list[str],
                cat_cols: set[str], decoders: dict) -> pd.DataFrame:
    """Write imputed matrix values back, decoding categorical codes."""
    out = pdf.copy()
    for j, c in enumerate(columns):
        v = x[:, j]
        if c in cat_cols:
            cats = decoders[c]
            codes = np.clip(np.rint(v), 0, len(cats) - 1).astype(int)
            out[c] = pd.array([cats[k] for k in codes], dtype=pdf[c].dtype
                              if not pdf[c].isna().any() else None)
        else:
            out[c] = v
    return out


def mean_fill(x: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Column-mean initial fill; returns (filled, missing mask)."""
    miss = np.isnan(x)
    mu = np.nanmean(x, axis=0)
    mu = np.where(np.isnan(mu), 0.0, mu)
    filled = np.where(miss, mu, x)
    return filled, miss


def minmax(x: np.ndarray):
    lo, hi = x.min(axis=0), x.max(axis=0)
    span = np.where(hi > lo, hi - lo, 1.0)
    return (x - lo) / span, lo, span


class Adam:
    """Plain Adam over a list of parameter arrays."""

    def __init__(self, params: list[np.ndarray], lr: float = 1e-3,
                 b1: float = 0.9, b2: float = 0.999, eps: float = 1e-8):
        self.params = params
        self.lr, self.b1, self.b2, self.eps = lr, b1, b2, eps
        self.m = [np.zeros_like(p) for p in params]
        self.v = [np.zeros_like(p) for p in params]
        self.t = 0

    def step(self, grads: list[np.ndarray]) -> None:
        self.t += 1
        for p, g, m, v in zip(self.params, grads, self.m, self.v):
            m *= self.b1
            m += (1 - self.b1) * g
            v *= self.b2
            v += (1 - self.b2) * g * g
            mh = m / (1 - self.b1**self.t)
            vh = v / (1 - self.b2**self.t)
            p -= self.lr * mh / (np.sqrt(vh) + self.eps)
