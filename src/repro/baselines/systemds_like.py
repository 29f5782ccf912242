"""SystemDS/MADlib-style MICE competitors, on the same Spark substrate.

These reproduce the *cost structure* Figure 4 attributes to the competitors
(not their codebases):

* one-hot encoding of categorical attributes in a materialized preprocessing
  step — every category becomes a physical indicator column;
* the cofactor matrix computed with O(w²) plain *scalar* SQL aggregates over
  the one-hot width ``w`` (no ring value, no group-by compaction);
* direct solve of the normal equations per column, retrained from scratch on
  every column of every iteration (no computation sharing);
* ``madlib=True`` additionally re-materializes the training projection per
  column, modelling MADlib's dense-matrix staging.

Model quality is equivalent to ours by construction (the paper reports <1 %
RMSE difference vs SystemDS/MADlib after convergence): the same normal
equations for continuous targets, and LDA parameter extraction for
categorical ones — both read from the scalar-SQL cofactor matrix.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.mice.baseline import MiceResult
from repro.mice.prep import Prepared, mask_col, prepare
from repro.mice.step import attr_seed
from repro.mice.timing import TimingLog
from repro.models.stochastic import box_muller_expr
from repro.ring.schema import AttrSchema


def _onehot_cols(prep: Prepared) -> list[tuple[str, str, object]]:
    """(dense column name, source attr, category|None) in a fixed order."""
    cols: list[tuple[str, str, object]] = []
    for a in prep.schema.names:
        if prep.schema.is_cat(a):
            for v in prep.categories[a]:
                cols.append((f"__oh_{a}_{v}", a, v))
        else:
            cols.append((a, a, None))
    return cols


def _encode(df: DataFrame, cols) -> DataFrame:
    for name, attr, v in cols:
        if v is not None:
            df = df.withColumn(name, (F.col(attr) == F.lit(v)).cast("double"))
    return df


def mice_competitor(
    df: DataFrame,
    schema: AttrSchema,
    incomplete: list[str],
    *,
    iters: int = 1,
    noise: bool = False,
    seed: int = 0,
    l2: float = 1e-3,
    madlib: bool = False,
    timing: TimingLog | None = None,
) -> MiceResult:
    """Run the competitor-style MICE (no ring, no sharing, one-hot)."""
    timing = timing or TimingLog()
    with timing.time("preprocess.prepare"):
        prep = prepare(df, schema, incomplete)
    with timing.time("preprocess.onehot"):
        cols = _onehot_cols(prep)
        cur = _encode(prep.df, cols).localCheckpoint(eager=True)
    names = [c[0] for c in cols]

    for it in range(iters):
        for ai, attr in enumerate(incomplete):
            is_cat = schema.is_cat(attr)
            target_cols = [c for c in cols if c[1] == attr]
            feat = [c for c in cols if c[1] != attr]
            observed = cur.filter(~F.col(mask_col(attr)))
            if madlib:
                with timing.time("iter.materialize"):
                    observed = observed.select(
                        *names, mask_col(attr)
                    ).localCheckpoint(eager=True)
            with timing.time("iter.cofactor"):
                # O(w²) scalar SUM aggregates in one wide aggregation
                aggs = [F.count(F.lit(1)).alias("__n")]
                w = [c[0] for c in feat] + [c[0] for c in target_cols]
                for i, a in enumerate(w):
                    aggs.append(F.sum(F.col(a)).alias(f"s_{i}"))
                    for j in range(i, len(w)):
                        aggs.append(
                            F.sum(F.col(a) * F.col(w[j])).alias(f"q_{i}_{j}")
                        )
                row = observed.agg(*aggs).collect()[0]
            with timing.time("iter.train"):
                p = len(w)
                n = float(row["__n"])
                mat = np.zeros((p + 1, p + 1))
                mat[0, 0] = n
                for i in range(p):
                    mat[0, i + 1] = float(row[f"s_{i}"] or 0.0)
                    for j in range(i, p):
                        mat[i + 1, j + 1] = float(row[f"q_{i}_{j}"] or 0.0)
                mat = np.triu(mat) + np.triu(mat, 1).T
                nf = len(feat) + 1  # bias + features
                fm = mat[:nf, :nf]
                if n == 0:
                    continue
                if not is_cat:
                    c = mat[:nf, nf]
                    reg = l2 * n * np.eye(nf)
                    reg[0, 0] = 0.0
                    theta = np.linalg.solve(fm + reg, c)
                    q_tt = mat[nf, nf]
                    sigma2 = max(
                        float(theta @ fm @ theta - 2 * theta @ c + q_tt) / n, 0.0
                    )
                    pred = _linear_expr(theta, feat)
                    if noise and sigma2 > 0:
                        pred = pred + box_muller_expr(
                            float(np.sqrt(sigma2)), attr_seed(seed, it, ai)
                        )
                else:
                    pred = _lda_expr(mat, nf, feat, target_cols, prep, attr)
                    if pred is None:
                        continue
            with timing.time("iter.update"):
                cur = cur.withColumn(
                    attr,
                    F.when(F.col(mask_col(attr)), pred).otherwise(F.col(attr)),
                )
                if is_cat:
                    cur = _encode(cur, target_cols)  # refresh indicators
                cur = cur.localCheckpoint(eager=True)

    out = cur.drop(*[c[0] for c in cols if c[2] is not None])
    return MiceResult(df=out, timing=timing, prep=prep)


def _linear_expr(theta: np.ndarray, feat) -> Column:
    expr = F.lit(float(theta[0]))
    for th, (name, _, _) in zip(theta[1:], feat):
        expr = expr + F.lit(float(th)) * F.col(name)
    return expr


def _lda_expr(mat, nf, feat, target_cols, prep: Prepared, attr: str):
    """LDA scores from the scalar-SQL cofactor (same math as repro.models.lda)."""
    p = nf - 1
    n_c = np.array([mat[nf + k, nf + k] for k in range(len(target_cols))])
    keep = n_c > 0
    if not keep.any():
        return None
    classes = [v for (_, _, v), kp in zip(target_cols, keep) if kp]
    n_c = n_c[keep]
    n = n_c.sum()
    s_c = np.stack(
        [mat[1:nf, nf + k] for k, kp in enumerate(keep) if kp]
    )
    mu = s_c / n_c[:, None]
    fm = mat[1:nf, 1:nf]
    sigma = fm / n - (mu.T * (n_c / n)) @ mu
    ridge = 1e-4 * max(np.trace(sigma) / max(p, 1), 1e-12) * np.eye(p)
    a = np.linalg.solve(sigma + ridge, mu.T).T
    b = np.log(n_c / n) - 0.5 * np.einsum("cp,cp->c", mu, a)
    scores = []
    for ci in range(len(classes)):
        e = F.lit(float(b[ci]))
        for k, (name, _, _) in enumerate(feat):
            e = e + F.lit(float(a[ci, k])) * F.col(name)
        scores.append(e)
    arr = F.array(*scores)
    idx = F.array_position(arr, F.array_max(arr)).cast("int")
    return F.element_at(F.array(*[F.lit(c) for c in classes]), idx)
