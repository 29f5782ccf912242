"""Ridge linear regression trained from a cofactor Triple (Section 2.2/3.1).

Training never touches the data again: the dense one-hot expansion of the
triple provides ``F = X^T X`` (features, incl. bias and one-hot categoricals)
and ``c = X^T y``, and the parameters solve ``(F + λN·I) θ = c``. Two
solvers are provided:

* ``method="gd"``  — batch gradient descent ``θ ← θ − α(Fθ − c)/N`` as in the
  paper (each step is O(p²), decoupled from the data size); the step size is
  1/L with L the largest eigenvalue of F/N + λ (guaranteed convergence).
* ``method="solve"`` — direct solve (used as the default; identical result
  up to the GD tolerance, cheaper at our model sizes).

Prediction is a pure Catalyst column expression: continuous features
contribute ``θ_j * col``, categorical features a literal-map lookup
``map[col]`` (missing category → 0), so imputation runs as a single Spark
projection with no Python UDF on the hot path.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Any

import numpy as np
import pandas as pd
from pyspark.sql import Column
from pyspark.sql import functions as F

from repro.ring.schema import AttrSchema
from repro.ring.triple import Triple


@dataclass
class RidgeModel:
    """Linear model over the one-hot feature space of ``schema`` minus ``target``.

    ``features`` lists dense feature columns as ``(-1, None)`` for the bias,
    ``(attr_index, None)`` for continuous and ``(attr_index, category)`` for
    categorical indicators; ``theta`` is parallel to it. ``sigma2`` is the
    residual variance (set for stochastic regression, 0 otherwise).
    """

    schema: AttrSchema
    target: str
    features: list[tuple[int, Any]]
    theta: np.ndarray
    sigma2: float = 0.0
    gd_iters: int = 0

    # ------------------------------------------------------------- predict
    def predict_expr(self) -> Column:
        """Catalyst expression computing θᵀx over the feature columns."""
        schema = self.schema
        # bias
        expr = F.lit(float(self.theta[0]))
        # group categorical coefficients per attribute into one map lookup
        cat_coeffs: dict[int, dict[Any, float]] = {}
        for (i, v), th in zip(self.features[1:], self.theta[1:]):
            if v is None:
                expr = expr + F.lit(float(th)) * F.col(schema.names[i])
            else:
                cat_coeffs.setdefault(i, {})[v] = float(th)
        for i, coeffs in cat_coeffs.items():
            kv = []
            for v, th in coeffs.items():
                kv.extend([F.lit(v), F.lit(th)])
            expr = expr + F.coalesce(
                F.create_map(*kv)[F.col(schema.names[i])], F.lit(0.0)
            )
        return expr

    def predict_np(self, pdf: pd.DataFrame) -> np.ndarray:
        """Driver-side prediction over a pandas frame (for evaluation)."""
        out = np.full(len(pdf), float(self.theta[0]))
        for (i, v), th in zip(self.features[1:], self.theta[1:]):
            col = self.schema.names[i]
            if v is None:
                out += float(th) * pdf[col].to_numpy(dtype=float)
            else:
                out += float(th) * (pdf[col] == v).to_numpy(dtype=float)
        return out


def train_ridge(
    triple: Triple,
    target: str,
    *,
    l2: float = 1e-3,
    method: str = "solve",
    categories: dict[str, list] | None = None,
    lr_scale: float = 1.0,
    max_iters: int = 2000,
    tol: float = 1e-9,
) -> RidgeModel:
    """Learn ridge regression parameters for continuous ``target`` from a Triple.

    ``categories`` pins categorical domains (pass the global-cofactor domains
    inside MICE so parameter vectors stay aligned as C ± ΔC evolves).
    """
    schema = triple.schema
    if schema.is_cat(target):
        raise ValueError(f"{target} is categorical — use LDA")
    dense = triple.to_dense(categories=categories)
    t_idx = schema.index(target)
    tcol = dense.pos[(t_idx, None)]
    feat = [k for k in range(len(dense.columns)) if k != tcol]
    n = max(dense.n, 1.0)
    fmat = dense.mat[np.ix_(feat, feat)]
    c = dense.mat[feat, tcol]
    reg = l2 * n * np.eye(len(feat))
    reg[0, 0] = 0.0  # do not penalize the bias
    iters = 0
    if method == "solve":
        theta = np.linalg.solve(fmat + reg, c)
    elif method == "gd":
        a = fmat / n + reg / n
        # Lipschitz constant of the quadratic loss gradient
        lip = float(np.linalg.eigvalsh(a).max())
        step = lr_scale / max(lip, 1e-12)
        theta = np.zeros(len(feat))
        b = c / n
        for iters in range(1, max_iters + 1):
            grad = a @ theta - b
            new = theta - step * grad
            if np.max(np.abs(new - theta)) < tol * max(1.0, np.max(np.abs(new))):
                theta = new
                break
            theta = new
    else:
        raise ValueError(f"unknown method {method!r}")

    # residual variance σ² = (θ_f^T X^T X θ_f)/N with θ_f = [θ; -1] (Sec 3.1)
    q_tt = dense.mat[tcol, tcol]
    sigma2 = float(theta @ fmat @ theta - 2.0 * theta @ c + q_tt) / n
    sigma2 = max(sigma2, 0.0)

    features = [dense.columns[k] for k in feat]
    return RidgeModel(
        schema=schema,
        target=target,
        features=features,
        theta=theta,
        sigma2=sigma2,
        gd_iters=iters,
    )
