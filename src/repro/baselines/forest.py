"""MissForest-lite: iterative random-forest imputation in NumPy.

The algorithm class of Stekhoven & Bühlmann (2012) — per incomplete column,
fit a random forest on the observed rows and predict the missing ones,
cycling until ``iters`` rounds. Trees are vectorized CART with quantile
candidate splits, bootstrap sampling, and sqrt-feature subsetting.
Categorical targets use majority-vote leaves over category codes. Also
reused as the MindsDB stand-in (tree ensemble per column) in the runtime
benchmarks.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ._np_utils import from_matrix, mean_fill, to_matrix


class _Tree:
    """CART with variance-reduction splits on quantile candidates."""

    __slots__ = ("feat", "thr", "left", "right", "value")

    def __init__(self, feat=-1, thr=0.0, left=None, right=None, value=0.0):
        self.feat, self.thr = feat, thr
        self.left, self.right, self.value = left, right, value

    def predict(self, x: np.ndarray) -> np.ndarray:
        out = np.empty(len(x))
        stack = [(self, np.arange(len(x)))]
        while stack:
            node, idx = stack.pop()
            if node.feat < 0:
                out[idx] = node.value
                continue
            go_l = x[idx, node.feat] <= node.thr
            stack.append((node.left, idx[go_l]))
            stack.append((node.right, idx[~go_l]))
        return out


def _grow(x, y, g, max_depth, min_leaf, n_feats):
    if max_depth == 0 or len(y) < 2 * min_leaf or np.ptp(y) == 0.0:
        return _Tree(value=float(y.mean()))
    feats = g.choice(x.shape[1], size=n_feats, replace=False)
    best = (0.0, None, None)
    base = y.var() * len(y)
    for f in feats:
        xs = x[:, f]
        for thr in np.quantile(xs, [0.25, 0.5, 0.75]):
            m = xs <= thr
            nl = int(m.sum())
            if nl < min_leaf or len(y) - nl < min_leaf:
                continue
            yl, yr = y[m], y[~m]
            gain = base - (yl.var() * nl + yr.var() * (len(y) - nl))
            if gain > best[0]:
                best = (gain, f, thr)
    if best[1] is None:
        return _Tree(value=float(y.mean()))
    _, f, thr = best
    m = x[:, f] <= thr
    return _Tree(
        feat=int(f),
        thr=float(thr),
        left=_grow(x[m], y[m], g, max_depth - 1, min_leaf, n_feats),
        right=_grow(x[~m], y[~m], g, max_depth - 1, min_leaf, n_feats),
    )


class RandomForest:
    """Bootstrap ensemble of CART trees (regression on values or codes)."""

    def __init__(self, n_trees=8, max_depth=8, min_leaf=5, seed=0,
                 max_rows=10_000):
        self.n_trees, self.max_depth = n_trees, max_depth
        self.min_leaf, self.seed, self.max_rows = min_leaf, seed, max_rows
        self.trees: list[_Tree] = []

    def fit(self, x: np.ndarray, y: np.ndarray) -> "RandomForest":
        g = np.random.default_rng(self.seed)
        n_feats = max(1, int(np.sqrt(x.shape[1])))
        self.trees = []
        for _ in range(self.n_trees):
            idx = g.integers(0, len(y), min(len(y), self.max_rows))
            self.trees.append(
                _grow(x[idx], y[idx], g, self.max_depth, self.min_leaf, n_feats)
            )
        return self

    def predict(self, x: np.ndarray) -> np.ndarray:
        return np.mean([t.predict(x) for t in self.trees], axis=0)


def impute(
    pdf: pd.DataFrame,
    incomplete: list[str],
    cat_cols: set[str],
    *,
    all_cols: list[str] | None = None,
    iters: int = 3,
    n_trees: int = 8,
    max_depth: int = 8,
    seed: int = 0,
) -> pd.DataFrame:
    """MissForest-style iterative imputation."""
    cols = all_cols or list(pdf.columns)
    x, decoders = to_matrix(pdf, cols, cat_cols)
    x, miss = mean_fill(x)
    col_idx = {c: j for j, c in enumerate(cols)}
    for it in range(iters):
        for c in incomplete:
            j = col_idx[c]
            mj = miss[:, j]
            if not mj.any() or mj.all():
                continue
            others = [k for k in range(x.shape[1]) if k != j]
            rf = RandomForest(
                n_trees=n_trees, max_depth=max_depth, seed=seed + 31 * it + j
            ).fit(x[~mj][:, others], x[~mj, j])
            pred = rf.predict(x[mj][:, others])
            if c in cat_cols:
                pred = np.rint(pred)
            x[mj, j] = pred
    return from_matrix(x, pdf, cols, cat_cols, decoders)
