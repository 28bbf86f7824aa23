"""Multimodal KGE substitutes: TransAE, RSME, MKGformer (DESIGN.md).

**Image substrate.**  No product photos exist offline; the property the
paper's multimodal results rely on is that a product image carries
*category-level visual signal* (a rice bag looks like other rice bags).
:func:`synth_image_features` therefore derives each multimodal entity's
feature vector deterministically from its category (plus entity noise),
and non-visual entities get zero features with a modality flag — the
same shape a frozen vision encoder would produce.

**Models.**
- :class:`TransAE` — TransE whose entity embedding is augmented by an
  autoencoder-style learned projection of the visual feature;
- :class:`RSME` — adds the paper's filter/forget gating: a learned
  per-dimension sigmoid gate decides how much visual signal enters;
- :class:`MKGformerLite` — bilinear (multi-level-fusion token) scoring
  over struct+visual fused embeddings, BCE-trained.
"""
from __future__ import annotations

import zlib
from typing import List

import numpy as np
import pandas as pd

from repro.kge.base import KGEModel, bce_loss_grad, sigmoid
from repro.kge.data import KGEDataset


def _hash_vec(key: str, dim: int, seed: int) -> np.ndarray:
    g = np.random.default_rng(zlib.crc32(f"{seed}:{key}".encode()) % (2**31))
    return g.normal(0, 1, dim)


def synth_image_features(
    entities: List[str],
    category_of: pd.Series,
    dim: int = 16,
    seed: int = 29,
    noise: float = 0.4,
) -> np.ndarray:
    """(n_ent, dim) visual features; zero rows = no image.

    ``category_of``: product_id → category node for multimodal products
    (only those get features).
    """
    X = np.zeros((len(entities), dim))
    for i, e in enumerate(entities):
        if e in category_of.index:
            base = _hash_vec(str(category_of[e]), dim, seed)
            jitter = _hash_vec(e, dim, seed + 1)
            v = base + noise * jitter
            X[i] = v / np.linalg.norm(v)
    return X


class _VisualMixin:
    """Entity embedding = struct + (gated) projected visual feature."""

    def _fused(self) -> np.ndarray:
        E = self.params["E"] + self._visual_part()
        return E

    def _visual_part(self) -> np.ndarray:
        raise NotImplementedError


class TransAE(KGEModel, _VisualMixin):
    """Wang et al. 2019: unified embedding via visual auto-encoding."""

    name = "TransAE"

    def __init__(self, n_ent, n_rel, img: np.ndarray, dim=32, seed=0, lr=0.1, margin=1.0):
        super().__init__(n_ent, n_rel, dim, seed, lr)
        self.margin = margin
        self.img = img
        self.add_param("E", (n_ent, dim))
        self.add_param("R", (n_rel, dim))
        self.add_param("V", (img.shape[1], dim))

    def _visual_part(self) -> np.ndarray:
        return self.img @ self.params["V"]

    def score_triples(self, tr: np.ndarray) -> np.ndarray:
        E = self._fused()
        u = E[tr[:, 0]] + self.params["R"][tr[:, 1]] - E[tr[:, 2]]
        return -np.einsum("ij,ij->i", u, u)

    def train_step(self, pos: np.ndarray, neg: np.ndarray) -> float:
        k = len(neg) // len(pos)
        p = np.repeat(pos, k, axis=0)
        E = self._fused()
        R = self.params["R"]
        up = E[p[:, 0]] + R[p[:, 1]] - E[p[:, 2]]
        un = E[neg[:, 0]] + R[neg[:, 1]] - E[neg[:, 2]]
        viol = self.margin + np.einsum("ij,ij->i", up, up) - np.einsum("ij,ij->i", un, un)
        act = viol > 0
        if not act.any():
            return 0.0
        pa, na, upa, una = p[act], neg[act], up[act], un[act]
        self.sparse_update("E", np.concatenate([pa[:, 0], na[:, 2]]),
                           2 * np.concatenate([upa, una]))
        self.sparse_update("E", np.concatenate([pa[:, 2], na[:, 0]]),
                           -2 * np.concatenate([upa, una]))
        self.sparse_update("R", np.concatenate([pa[:, 1], na[:, 1]]),
                           2 * np.concatenate([upa, -una]))
        gV = (
            self.img[pa[:, 0]].T @ (2 * upa)
            + self.img[pa[:, 2]].T @ (-2 * upa)
            + self.img[na[:, 0]].T @ (-2 * una)
            + self.img[na[:, 2]].T @ (2 * una)
        )
        self.dense_update("V", gV)
        return float(viol[act].sum())

    def score_candidates(self, h: int, r: int, tails: bool = True) -> np.ndarray:
        E = self._fused()
        rv = self.params["R"][r]
        diff = (E[h] + rv)[None, :] - E if tails else E + rv[None, :] - E[h][None, :]
        return -np.einsum("ij,ij->i", diff, diff)


class RSME(TransAE):
    """Wang et al. 2021: relation-sensitive filter/forget gate on the
    visual channel — per-dimension sigmoid gate g ∘ (img·V)."""

    name = "RSME"

    def __init__(self, *a, **kw):
        super().__init__(*a, **kw)
        self.add_param("G", (self.dim,), scale=0.5)

    def _visual_part(self) -> np.ndarray:
        return sigmoid(self.params["G"])[None, :] * (self.img @ self.params["V"])

    def train_step(self, pos: np.ndarray, neg: np.ndarray) -> float:
        # gate gradient via finite shared chain: reuse TransAE updates on
        # V (scaled through the gate) and nudge G by its analytic grad.
        k = len(neg) // len(pos)
        p = np.repeat(pos, k, axis=0)
        g = sigmoid(self.params["G"])
        E = self._fused()
        R = self.params["R"]
        up = E[p[:, 0]] + R[p[:, 1]] - E[p[:, 2]]
        un = E[neg[:, 0]] + R[neg[:, 1]] - E[neg[:, 2]]
        viol = self.margin + np.einsum("ij,ij->i", up, up) - np.einsum("ij,ij->i", un, un)
        act = viol > 0
        if not act.any():
            return 0.0
        pa, na, upa, una = p[act], neg[act], up[act], un[act]
        self.sparse_update("E", np.concatenate([pa[:, 0], na[:, 2]]),
                           2 * np.concatenate([upa, una]))
        self.sparse_update("E", np.concatenate([pa[:, 2], na[:, 0]]),
                           -2 * np.concatenate([upa, una]))
        self.sparse_update("R", np.concatenate([pa[:, 1], na[:, 1]]),
                           2 * np.concatenate([upa, -una]))
        gV = (
            self.img[pa[:, 0]].T @ (2 * upa)
            + self.img[pa[:, 2]].T @ (-2 * upa)
            + self.img[na[:, 0]].T @ (-2 * una)
            + self.img[na[:, 2]].T @ (2 * una)
        ) * g[None, :]
        self.dense_update("V", gV)
        P = self.img @ self.params["V"]
        gG_raw = (
            np.sum((P[pa[:, 0]] - P[pa[:, 2]]) * (2 * upa), axis=0)
            + np.sum((P[na[:, 0]] - P[na[:, 2]]) * (-2 * una), axis=0)
        )
        self.dense_update("G", gG_raw * g * (1 - g))
        return float(viol[act].sum())


class MKGformerLite(KGEModel, _VisualMixin):
    """Chen et al. 2022 (lite): bilinear scoring over fused embeddings."""

    name = "MKGformer"

    def __init__(self, n_ent, n_rel, img: np.ndarray, dim=32, seed=0, lr=0.1):
        super().__init__(n_ent, n_rel, dim, seed, lr)
        self.img = img
        self.add_param("E", (n_ent, dim))
        self.add_param("R", (n_rel, dim))
        self.add_param("V", (img.shape[1], dim))

    def _visual_part(self) -> np.ndarray:
        return self.img @ self.params["V"]

    def score_triples(self, tr: np.ndarray) -> np.ndarray:
        E = self._fused()
        return np.einsum(
            "ij,ij,ij->i", E[tr[:, 0]], self.params["R"][tr[:, 1]], E[tr[:, 2]]
        )

    def train_step(self, pos: np.ndarray, neg: np.ndarray) -> float:
        tr = np.concatenate([pos, neg])
        labels = np.concatenate([np.ones(len(pos)), np.zeros(len(neg))])
        E = self._fused()
        R = self.params["R"]
        h, r, t = E[tr[:, 0]], R[tr[:, 1]], E[tr[:, 2]]
        loss, g = bce_loss_grad(np.einsum("ij,ij,ij->i", h, r, t), labels)
        g = g[:, None]
        gh, gt = g * r * t, g * r * h
        self.sparse_update("E", tr[:, 0], gh)
        self.sparse_update("E", tr[:, 2], gt)
        self.sparse_update("R", tr[:, 1], g * h * t)
        gV = self.img[tr[:, 0]].T @ gh + self.img[tr[:, 2]].T @ gt
        self.dense_update("V", gV)
        return loss

    def score_candidates(self, h: int, r: int, tails: bool = True) -> np.ndarray:
        E = self._fused()
        return E @ (E[h] * self.params["R"][r])


def image_features_for_dataset(data: KGEDataset, kg, dim: int = 16) -> np.ndarray:
    """Visual features aligned to a dataset's entity indexing."""
    mm = kg.multimodal_products().set_index("product_id")["category"]
    return synth_image_features(data.entities, mm, dim=dim)
