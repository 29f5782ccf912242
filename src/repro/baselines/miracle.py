"""MIRACLE-lite: causally-regularized iterative refinement (Kyono et al. 2021).

MIRACLE refines a baseline imputation by jointly learning one predictor per
feature under a sparsity ("causal parent") regularizer and re-imputing until
the imputations stabilize. This lite version keeps that loop with
L1-regularized linear predictors fit by ISTA — capturing the quality class
(≈ chained linear models, robust under MCAR/MNAR) and the cost class (many
full-matrix refinement epochs, by far the slowest baseline), without the
causal-graph MLP machinery.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ._np_utils import from_matrix, mean_fill, minmax, to_matrix


def _ista(x, y, lam, iters=150):
    """L1-regularized least squares via ISTA (with intercept, unpenalized)."""
    n, p = x.shape
    xb = np.hstack([np.ones((n, 1)), x])
    lip = np.linalg.eigvalsh(xb.T @ xb / n).max()
    step = 1.0 / max(lip, 1e-12)
    theta = np.zeros(p + 1)
    for _ in range(iters):
        grad = xb.T @ (xb @ theta - y) / n
        theta = theta - step * grad
        theta[1:] = np.sign(theta[1:]) * np.maximum(
            np.abs(theta[1:]) - step * lam, 0.0
        )
    return theta


def impute(
    pdf: pd.DataFrame,
    incomplete: list[str],
    cat_cols: set[str],
    *,
    all_cols: list[str] | None = None,
    epochs: int = 20,
    lam: float = 0.005,
    ista_iters: int = 150,
    seed: int = 0,
) -> pd.DataFrame:
    """Refine a mean-imputation baseline with sparse per-feature predictors."""
    cols = all_cols or list(pdf.columns)
    x_raw, decoders = to_matrix(pdf, cols, cat_cols)
    x0, miss = mean_fill(x_raw)
    xn, lo, span = minmax(x0)
    col_idx = {c: j for j, c in enumerate(cols)}
    targets = [col_idx[c] for c in incomplete if miss[:, col_idx[c]].any()]
    for _ in range(epochs):
        new = xn.copy()
        for j in targets:
            mj = miss[:, j]
            if mj.all():
                continue
            others = [k for k in range(xn.shape[1]) if k != j]
            theta = _ista(xn[~mj][:, others], xn[~mj, j], lam, iters=ista_iters)
            pred = np.hstack(
                [np.ones((int(mj.sum()), 1)), xn[mj][:, others]]
            ) @ theta
            new[mj, j] = pred
        if np.max(np.abs(new - xn)) < 1e-5:
            xn = new
            break
        xn = new
    out = xn * span + lo
    for c in incomplete:
        if c in cat_cols:
            j = col_idx[c]
            out[:, j] = np.rint(out[:, j])
    return from_matrix(out, pdf, cols, cat_cols, decoders)
