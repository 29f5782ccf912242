"""MIDASpy-lite: denoising-autoencoder imputation (Lall & Robinson 2022).

A two-layer autoencoder trained with input corruption (MIDAS's
"multiple imputation denoising"): observed entries are randomly dropped on
each minibatch and the network reconstructs them; missing entries are then
imputed from the reconstruction. Adam-trained NumPy MLP, sigmoid output over
min-max-scaled data.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ._np_utils import Adam, from_matrix, mean_fill, minmax, to_matrix


def impute(
    pdf: pd.DataFrame,
    incomplete: list[str],
    cat_cols: set[str],
    *,
    all_cols: list[str] | None = None,
    epochs: int = 30,
    batch: int = 256,
    hidden: int = 64,
    corrupt: float = 0.5,
    seed: int = 0,
) -> pd.DataFrame:
    """Train the denoising autoencoder and impute from its reconstruction."""
    g = np.random.default_rng(seed)
    cols = all_cols or list(pdf.columns)
    x_raw, decoders = to_matrix(pdf, cols, cat_cols)
    x0, miss = mean_fill(x_raw)
    xn, lo, span = minmax(x0)
    n, d = xn.shape
    h = min(hidden, 4 * d)
    obs = (~miss).astype(float)

    w1 = g.normal(0, np.sqrt(2.0 / d), (d, h))
    b1 = np.zeros(h)
    w2 = g.normal(0, np.sqrt(2.0 / h), (h, d))
    b2 = np.zeros(d)
    opt = Adam([w1, b1, w2, b2], lr=1e-3)

    steps = max(1, n // batch)
    for _ in range(epochs):
        perm = g.permutation(n)
        for s in range(steps):
            idx = perm[s * batch:(s + 1) * batch]
            xb, ob = xn[idx], obs[idx]
            drop = (g.random(xb.shape) < corrupt) & (ob > 0)
            xin = np.where(drop, 0.0, xb)
            hidden_a = np.maximum(xin @ w1 + b1, 0.0)
            out = 1.0 / (1.0 + np.exp(-(hidden_a @ w2 + b2)))
            # reconstruct observed entries only
            derr = 2.0 * ob * (out - xb) / max(len(idx), 1)
            dz2 = derr * out * (1 - out)
            gw2, gb2 = hidden_a.T @ dz2, dz2.sum(axis=0)
            dh = (dz2 @ w2.T) * (hidden_a > 0)
            gw1, gb1 = xin.T @ dh, dh.sum(axis=0)
            opt.step([gw1, gb1, gw2, gb2])

    hidden_a = np.maximum(np.where(miss, 0.0, xn) @ w1 + b1, 0.0)
    recon = 1.0 / (1.0 + np.exp(-(hidden_a @ w2 + b2)))
    filled = np.where(miss, recon, xn)
    out = filled * span + lo
    for c in incomplete:
        if c in cat_cols:
            j = cols.index(c)
            out[:, j] = np.rint(out[:, j])
    return from_matrix(out, pdf, cols, cat_cols, decoders)
