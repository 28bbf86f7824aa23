"""TuckER (Balažević et al. 2019): core-tensor factorization.

s(h, r, t) = W ×₁ e_h ×₂ w_r ×₃ e_t with a learned core tensor
W ∈ ℝ^{d×d×d}.  Trained with BCE over sampled negatives (the original's
1-N softmax is a throughput optimization, not a modeling change, at our
scale).  The core gets dense AdaGrad updates; embeddings sparse ones.
"""
from __future__ import annotations

import numpy as np

from repro.kge.base import KGEModel, bce_loss_grad


class TuckER(KGEModel):
    name = "TuckER"

    def __init__(self, n_ent, n_rel, dim=24, seed=0, lr=0.05):
        super().__init__(n_ent, n_rel, dim, seed, lr)
        self.add_param("E", (n_ent, dim))
        self.add_param("R", (n_rel, dim))
        self.add_param("W", (dim, dim, dim), scale=0.1)

    @staticmethod
    def _outer(a: np.ndarray, b: np.ndarray) -> np.ndarray:
        """(B, d), (B, d) → (B, d²) batched outer product."""
        return (a[:, :, None] * b[:, None, :]).reshape(len(a), -1)

    def score_triples(self, tr: np.ndarray) -> np.ndarray:
        E, R, W = self.params["E"], self.params["R"], self.params["W"]
        h, r, t = E[tr[:, 0]], R[tr[:, 1]], E[tr[:, 2]]
        # s = vec(h ⊗ r) · W(ij)k · t — explicit matmuls: naive einsum
        # contraction orders are ~30× slower at batch size.
        hr = self._outer(h, r) @ W.reshape(self.dim * self.dim, self.dim)
        return np.einsum("bk,bk->b", hr, t)

    def train_step(self, pos: np.ndarray, neg: np.ndarray) -> float:
        d = self.dim
        tr = np.concatenate([pos, neg])
        labels = np.concatenate([np.ones(len(pos)), np.zeros(len(neg))])
        E, R, W = self.params["E"], self.params["R"], self.params["W"]
        h, r, t = E[tr[:, 0]], R[tr[:, 1]], E[tr[:, 2]]
        W_ij_k = W.reshape(d * d, d)
        hr = self._outer(h, r) @ W_ij_k
        s = np.einsum("bk,bk->b", hr, t)
        loss, g = bce_loss_grad(s, labels)
        gt_scaled = g[:, None] * t
        g_t = g[:, None] * hr
        # g_h[b,i] = Σ_jk W_ijk r_j (g t)_k  = vec(r ⊗ gt) @ W(jk)i
        g_h = self._outer(r, gt_scaled) @ W.transpose(1, 2, 0).reshape(d * d, d)
        g_r = self._outer(h, gt_scaled) @ W.transpose(0, 2, 1).reshape(d * d, d)
        g_W = (self._outer(h, r).T @ gt_scaled).reshape(d, d, d)
        self.sparse_update("E", tr[:, 0], g_h)
        self.sparse_update("E", tr[:, 2], g_t)
        self.sparse_update("R", tr[:, 1], g_r)
        self.dense_update("W", g_W)
        return loss

    def score_candidates(self, h: int, r: int, tails: bool = True) -> np.ndarray:
        E, R, W = self.params["E"], self.params["R"], self.params["W"]
        if tails:
            vec = np.einsum("i,j,ijk->k", E[h], R[r], W)
        else:  # fixed tail, candidates are heads
            vec = np.einsum("j,k,ijk->i", R[r], E[h], W)
        return E @ vec
