"""Bilinear models: DistMult and ComplEx (BCE + negative sampling)."""
from __future__ import annotations

import numpy as np

from repro.kge.base import KGEModel, bce_loss_grad


class DistMult(KGEModel):
    """Yang et al. 2015: s = Σ h ∘ r ∘ t (symmetric in h/t — the
    weakness the paper's results expose on asymmetric business KGs)."""

    name = "DistMult"

    def __init__(self, n_ent, n_rel, dim=32, seed=0, lr=0.1):
        super().__init__(n_ent, n_rel, dim, seed, lr)
        self.add_param("E", (n_ent, dim))
        self.add_param("R", (n_rel, dim))

    def score_triples(self, tr: np.ndarray) -> np.ndarray:
        E, R = self.params["E"], self.params["R"]
        return np.einsum("ij,ij,ij->i", E[tr[:, 0]], R[tr[:, 1]], E[tr[:, 2]])

    def train_step(self, pos: np.ndarray, neg: np.ndarray) -> float:
        tr = np.concatenate([pos, neg])
        labels = np.concatenate([np.ones(len(pos)), np.zeros(len(neg))])
        E, R = self.params["E"], self.params["R"]
        h, r, t = E[tr[:, 0]], R[tr[:, 1]], E[tr[:, 2]]
        loss, g = bce_loss_grad(np.einsum("ij,ij,ij->i", h, r, t), labels)
        g = g[:, None]
        self.sparse_update("E", tr[:, 0], g * r * t)
        self.sparse_update("E", tr[:, 2], g * r * h)
        self.sparse_update("R", tr[:, 1], g * h * t)
        return loss

    def score_candidates(self, h: int, r: int, tails: bool = True) -> np.ndarray:
        E, R = self.params["E"], self.params["R"]
        return E @ (E[h] * R[r])  # symmetric: identical for heads/tails


class ComplEx(KGEModel):
    """Trouillon et al. 2016: Re⟨h, r, conj(t)⟩ over ℂ^{dim/2}."""

    name = "ComplEx"

    def __init__(self, n_ent, n_rel, dim=32, seed=0, lr=0.1):
        assert dim % 2 == 0, "ComplEx dim must be even (re/im halves)"
        super().__init__(n_ent, n_rel, dim, seed, lr)
        self.add_param("E", (n_ent, dim))
        self.add_param("R", (n_rel, dim))

    def _split(self, x):
        d = self.dim // 2
        return x[..., :d], x[..., d:]

    def score_triples(self, tr: np.ndarray) -> np.ndarray:
        E, R = self.params["E"], self.params["R"]
        hr, hi = self._split(E[tr[:, 0]])
        rr, ri = self._split(R[tr[:, 1]])
        tr_, ti = self._split(E[tr[:, 2]])
        return np.einsum(
            "ij->i",
            hr * rr * tr_ + hi * rr * ti + hr * ri * ti - hi * ri * tr_,
        )

    def train_step(self, pos: np.ndarray, neg: np.ndarray) -> float:
        tr = np.concatenate([pos, neg])
        labels = np.concatenate([np.ones(len(pos)), np.zeros(len(neg))])
        E, R = self.params["E"], self.params["R"]
        hr, hi = self._split(E[tr[:, 0]])
        rr, ri = self._split(R[tr[:, 1]])
        t_r, t_i = self._split(E[tr[:, 2]])
        s = np.einsum(
            "ij->i", hr * rr * t_r + hi * rr * t_i + hr * ri * t_i - hi * ri * t_r
        )
        loss, g = bce_loss_grad(s, labels)
        g = g[:, None]
        g_hr = g * (rr * t_r + ri * t_i)
        g_hi = g * (rr * t_i - ri * t_r)
        g_tr = g * (hr * rr - hi * ri)
        g_ti = g * (hi * rr + hr * ri)
        g_rr = g * (hr * t_r + hi * t_i)
        g_ri = g * (hr * t_i - hi * t_r)
        self.sparse_update("E", tr[:, 0], np.concatenate([g_hr, g_hi], axis=1))
        self.sparse_update("E", tr[:, 2], np.concatenate([g_tr, g_ti], axis=1))
        self.sparse_update("R", tr[:, 1], np.concatenate([g_rr, g_ri], axis=1))
        return loss

    def score_candidates(self, h: int, r: int, tails: bool = True) -> np.ndarray:
        E, R = self.params["E"], self.params["R"]
        er, ei = self._split(E)
        rr, ri = self._split(R[r])
        ar, ai = self._split(E[h])
        if tails:
            # Re⟨a, r, conj(t)⟩ over all t
            return (
                er @ (ar * rr - ai * ri) + ei @ (ai * rr + ar * ri)
            )
        # over all heads with fixed tail a
        return er @ (rr * ar + ri * ai) + ei @ (rr * ai - ri * ar)
