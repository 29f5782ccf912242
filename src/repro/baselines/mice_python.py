"""MICE-Python-lite: the external-tool chained-equations imputer.

Models scikit-learn's ``IterativeImputer`` cost/quality class: the dataset
is collected into memory, and for every incomplete column of every
iteration the one-hot design matrix of the *entire* dataset is
re-materialized and the normal equations re-solved from scratch — no ring,
no sharing, single process. Continuous targets use ridge regression;
categorical targets use LDA over the same design (the quality-equivalent of
the logistic models, cf. Section 6.2).
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def _design(pdf: pd.DataFrame, columns: list[str], cat_cols: set[str],
            categories: dict[str, list], exclude: str) -> np.ndarray:
    cols = [np.ones(len(pdf))]
    for c in columns:
        if c == exclude:
            continue
        if c in cat_cols:
            for v in categories[c]:
                cols.append((pdf[c] == v).to_numpy(dtype=float))
        else:
            cols.append(pdf[c].to_numpy(dtype=float))
    return np.column_stack(cols)


def impute(
    pdf: pd.DataFrame,
    incomplete: list[str],
    cat_cols: set[str],
    *,
    all_cols: list[str] | None = None,
    iters: int = 5,
    l2: float = 1e-3,
    noise: bool = True,
    seed: int = 0,
) -> pd.DataFrame:
    """Chained-equations imputation over a pandas frame."""
    g = np.random.default_rng(seed)
    cols = all_cols or list(pdf.columns)
    out = pdf[cols].copy()
    masks = {c: out[c].isna().to_numpy() for c in incomplete}
    categories = {
        c: sorted(pdf[c].dropna().unique().tolist())
        for c in cols
        if c in cat_cols
    }
    # initial mean/mode
    for c in cols:
        if out[c].isna().any():
            if c in cat_cols:
                out[c] = out[c].fillna(out[c].mode().iloc[0])
            else:
                out[c] = out[c].fillna(out[c].mean())

    for _ in range(iters):
        for c in incomplete:
            miss = masks[c]
            if not miss.any() or miss.all():
                continue
            x = _design(out, cols, cat_cols, categories, exclude=c)
            xo = x[~miss]
            if c not in cat_cols:
                y = out.loc[~miss, c].to_numpy(dtype=float)
                a = xo.T @ xo + l2 * len(xo) * np.eye(x.shape[1])
                a[0, 0] -= l2 * len(xo)
                theta = np.linalg.solve(a, xo.T @ y)
                pred = x[miss] @ theta
                if noise:
                    sigma = np.sqrt(max(((xo @ theta - y) ** 2).mean(), 0.0))
                    pred = pred + g.normal(0, sigma, miss.sum())
                out.loc[miss, c] = pred
            else:
                y = out.loc[~miss, c].to_numpy()
                classes = categories[c]
                feats = xo[:, 1:]
                n = len(feats)
                n_c = np.array([(y == cl).sum() for cl in classes], dtype=float)
                keep = n_c > 0
                cls = [cl for cl, k in zip(classes, keep) if k]
                n_c = n_c[keep]
                mu = np.stack([feats[y == cl].mean(axis=0) for cl in cls])
                sigma = feats.T @ feats / n - (mu.T * (n_c / n)) @ mu
                p = sigma.shape[0]
                sigma += 1e-4 * max(np.trace(sigma) / p, 1e-12) * np.eye(p)
                a_c = np.linalg.solve(sigma, mu.T).T
                b_c = np.log(n_c / n) - 0.5 * np.einsum("cp,cp->c", mu, a_c)
                scores = x[miss][:, 1:] @ a_c.T + b_c
                out.loc[miss, c] = np.asarray(cls, dtype=object)[
                    scores.argmax(axis=1)
                ]
    for c in incomplete:
        if c in cat_cols and pd.api.types.is_integer_dtype(pdf[c].dtype):
            out[c] = out[c].astype(pdf[c].dtype)
    return out
