"""GAIN-lite: Generative Adversarial Imputation Nets (Yoon et al. 2018) in NumPy.

Faithful to the published training loop at reduced scale: generator and
discriminator are two-layer MLPs over ``[x̃ ‖ mask]`` (resp. ``[x̂ ‖ hint]``),
trained with Adam on minibatches; the generator loss combines the
adversarial term on missing entries with α × reconstruction MSE on observed
entries; hints reveal a random ``hint_rate`` fraction of the true mask to
the discriminator. Categorical columns ride along as scaled codes and are
rounded on decode (documented simplification).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from ._np_utils import Adam, from_matrix, mean_fill, minmax, to_matrix


def _mlp_init(g, d_in, d_h, d_out):
    s1 = np.sqrt(2.0 / d_in)
    s2 = np.sqrt(2.0 / d_h)
    return [
        g.normal(0, s1, (d_in, d_h)),
        np.zeros(d_h),
        g.normal(0, s2, (d_h, d_out)),
        np.zeros(d_out),
    ]


def _mlp_forward(p, x):
    h = np.maximum(x @ p[0] + p[1], 0.0)
    o = 1.0 / (1.0 + np.exp(-(h @ p[2] + p[3])))
    return h, o


def _mlp_backward(p, x, h, o, dout):
    do = dout * o * (1 - o)
    g2 = h.T @ do
    b2 = do.sum(axis=0)
    dh = (do @ p[2].T) * (h > 0)
    g1 = x.T @ dh
    b1 = dh.sum(axis=0)
    return [g1, b1, g2, b2], dh @ p[0].T


def impute(
    pdf: pd.DataFrame,
    incomplete: list[str],
    cat_cols: set[str],
    *,
    all_cols: list[str] | None = None,
    iterations: int = 1500,
    batch: int = 128,
    alpha: float = 100.0,
    hint_rate: float = 0.9,
    seed: int = 0,
) -> pd.DataFrame:
    """Train GAIN and impute the missing entries."""
    g = np.random.default_rng(seed)
    cols = all_cols or list(pdf.columns)
    x_raw, decoders = to_matrix(pdf, cols, cat_cols)
    x0, miss = mean_fill(x_raw)
    xn, lo, span = minmax(x0)
    n, d = xn.shape
    m = (~miss).astype(float)  # 1 = observed (GAIN convention)

    gen = _mlp_init(g, 2 * d, d, d)
    dis = _mlp_init(g, 2 * d, d, d)
    opt_g, opt_d = Adam(gen, lr=1e-3), Adam(dis, lr=1e-3)

    for _ in range(iterations):
        idx = g.integers(0, n, min(batch, n))
        xb, mb = xn[idx], m[idx]
        z = g.uniform(0, 0.01, xb.shape)
        x_tilde = mb * xb + (1 - mb) * z
        gin = np.hstack([x_tilde, mb])
        hg, xhat = _mlp_forward(gen, gin)
        x_comb = mb * xb + (1 - mb) * xhat
        hint = mb * (g.random(mb.shape) < hint_rate)
        din = np.hstack([x_comb, hint])
        hd, dprob = _mlp_forward(dis, din)
        eps = 1e-8
        # discriminator step: cross-entropy on mask prediction
        ddout = -(mb / (dprob + eps) - (1 - mb) / (1 - dprob + eps)) / len(idx)
        dgrads, _ = _mlp_backward(dis, din, hd, dprob, ddout)
        opt_d.step(dgrads)
        # generator step: fool D on missing + α·MSE on observed
        hd, dprob = _mlp_forward(dis, np.hstack([x_comb, hint]))
        dout_adv = -((1 - mb) / (dprob + eps)) / len(idx)
        _, dx_comb = _mlp_backward(dis, np.hstack([x_comb, hint]), hd, dprob, dout_adv)
        dxhat = dx_comb[:, :d] * (1 - mb)
        dxhat = dxhat + alpha * 2.0 * mb * (xhat - xb) / len(idx)
        ggrads, _ = _mlp_backward(gen, gin, hg, xhat, dxhat)
        opt_g.step(ggrads)

    z = g.uniform(0, 0.01, xn.shape)
    gin = np.hstack([m * xn + (1 - m) * z, m])
    _, xhat = _mlp_forward(gen, gin)
    filled = m * xn + (1 - m) * xhat
    out = filled * span + lo
    return from_matrix(out, pdf, cols, cat_cols, decoders)
