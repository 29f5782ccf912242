"""Stochastic linear regression (Section 3.1).

Ridge regression plus Gaussian noise on predictions: ``f(x) = θᵀx + ε`` with
``ε ~ N(0, σ²)`` and ``σ²`` the residual variance computed from the same
cofactor triple used for training. The noise is generated inside Spark SQL
with the Box–Muller transform over two ``rand`` streams — exactly the SQL
the paper executes:

    ε = sqrt(-2 ln U₁) · cos(2π U₂) · σ
"""
from __future__ import annotations

import math

from pyspark.sql import Column
from pyspark.sql import functions as F

from repro.ring.triple import Triple
from .linreg import RidgeModel, train_ridge


def train_stochastic(triple: Triple, target: str, **kwargs) -> RidgeModel:
    """Train ridge parameters; σ² is computed by ``train_ridge`` already."""
    return train_ridge(triple, target, **kwargs)


def box_muller_expr(sigma: float, seed: int) -> Column:
    """N(0, sigma²) sample per row as a Catalyst expression.

    ``1 - rand`` keeps U₁ in (0, 1] so the log never sees 0.
    """
    u1 = F.lit(1.0) - F.rand(seed)
    u2 = F.rand(seed + 1_000_003)
    return F.sqrt(F.lit(-2.0) * F.log(u1)) * F.cos(F.lit(2.0 * math.pi) * u2) * F.lit(sigma)


def predict_stochastic_expr(model: RidgeModel, seed: int, noise: bool = True) -> Column:
    """θᵀx (+ Box–Muller noise) as a single Spark projection."""
    expr = model.predict_expr()
    if noise and model.sigma2 > 0:
        expr = expr + box_muller_expr(math.sqrt(model.sigma2), seed)
    return expr
