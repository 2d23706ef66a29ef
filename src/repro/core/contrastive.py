"""SimCLR / NT-Xent contrastive loss (paper Eq. 1–3) with analytic gradients.

Implemented exactly as the paper defines it:

- Eq. 1: single-pair loss with the denominator excluding both ``i`` and
  ``j`` (``1[k≠i, k≠j]``), similarity = cosine (rows are L2-normalized),
  temperature ``τ`` (paper fixes 0.07).
- Eq. 2: the single-column batch loss is the multi-column loss (Eq. 3)
  with pairs ``P = {(k, k+N)}``.
- Eq. 3: multi-column loss averages ``ℓ(i,j)+ℓ(j,i)`` over aligned pairs.

Gradients are derived in closed form (see ``loss_and_grad``) and are
verified against numerical differentiation in the tests.
"""
from __future__ import annotations

import numpy as np

TAU_DEFAULT = 0.07


def normalize_rows(u: np.ndarray, eps: float = 1e-12) -> np.ndarray:
    n = np.linalg.norm(u, axis=1, keepdims=True)
    return u / np.maximum(n, eps)


def nt_xent_loss(z: np.ndarray, pairs: list[tuple[int, int]], tau: float = TAU_DEFAULT) -> float:
    """Eq. 3 loss on already-normalized embeddings ``z`` (rows unit-norm)."""
    loss, _ = _loss_grad_z(z, pairs, tau, want_grad=False)
    return loss


def _loss_grad_z(
    z: np.ndarray, pairs: list[tuple[int, int]], tau: float, want_grad: bool = True
) -> tuple[float, np.ndarray | None]:
    n = z.shape[0]
    if not pairs:
        return 0.0, (np.zeros_like(z) if want_grad else None)
    s = (z @ z.T) / tau
    g = np.zeros((n, n)) if want_grad else None
    total = 0.0
    # ℓ(i,j) = -s_ij + log Σ_{k∉{i,j}} exp(s_ik)
    for a, b in pairs:
        for i, j in ((a, b), (b, a)):
            row = s[i].copy()
            row[i] = -np.inf
            row[j] = -np.inf
            m = row.max()
            e = np.exp(row - m)
            sum_e = e.sum()
            total += -s[i, j] + (m + np.log(sum_e))
            if want_grad:
                p = e / sum_e
                g[i] += p
                g[i, j] -= 1.0
    scale = 1.0 / (2 * len(pairs))
    loss = scale * total
    if not want_grad:
        return loss, None
    # dL/dz_a = scale/τ · Σ_b (G[a,b] + G[b,a]) z_b
    dz = scale / tau * ((g + g.T) @ z)
    return loss, dz


def loss_and_grad(
    u: np.ndarray, pairs: list[tuple[int, int]], tau: float = TAU_DEFAULT
) -> tuple[float, np.ndarray]:
    """Loss and gradient w.r.t. the *unnormalized* embeddings ``u``.

    Backprops the NT-Xent gradient through the row L2 normalization:
    with ``z = u/‖u‖``, ``dL/du = (dL/dz − (dL/dz·z) z)/‖u‖``.
    Zero rows (empty columns) get zero gradient.
    """
    norms = np.linalg.norm(u, axis=1, keepdims=True)
    safe = np.maximum(norms, 1e-12)
    z = u / safe
    loss, dz = _loss_grad_z(z, pairs, tau, want_grad=True)
    du = (dz - (np.sum(dz * z, axis=1, keepdims=True)) * z) / safe
    du[norms[:, 0] < 1e-12] = 0.0
    return loss, du


class Adam:
    """Minimal Adam optimizer over a list of numpy parameter arrays."""

    def __init__(self, params: list[np.ndarray], lr: float = 1e-2,
                 betas: tuple[float, float] = (0.9, 0.999), eps: float = 1e-8):
        self.params = params
        self.lr = lr
        self.b1, self.b2 = betas
        self.eps = eps
        self.m = [np.zeros_like(p) for p in params]
        self.v = [np.zeros_like(p) for p in params]
        self.t = 0

    def step(self, grads: list[np.ndarray]) -> None:
        self.t += 1
        for p, gr, m, v in zip(self.params, grads, self.m, self.v):
            m *= self.b1
            m += (1 - self.b1) * gr
            v *= self.b2
            v += (1 - self.b2) * gr * gr
            mh = m / (1 - self.b1**self.t)
            vh = v / (1 - self.b2**self.t)
            p -= self.lr * mh / (np.sqrt(vh) + self.eps)
