"""Base KGE model: parameter store, AdaGrad, training loop.

Every model implements ``score_triples`` (higher = more plausible) and
``train_step`` (one mini-batch gradient update).  The shared ``fit``
loop does deterministic shuffling, negative sampling and batching —
mirroring the paper's training setup (AdaGrad/SGD, negative sampling,
dim 200 at paper scale; dim ≤ 64 here).
"""
from __future__ import annotations

from typing import Dict, Optional

import numpy as np

from repro.kge.data import KGEDataset, negative_sample


class KGEModel:
    """Parameter store with sparse AdaGrad updates."""

    name = "base"

    def __init__(self, n_ent: int, n_rel: int, dim: int = 32, seed: int = 0, lr: float = 0.1):
        self.n_ent, self.n_rel, self.dim, self.lr = n_ent, n_rel, dim, lr
        self.rng = np.random.default_rng(seed)
        self.params: Dict[str, np.ndarray] = {}
        self._acc: Dict[str, np.ndarray] = {}

    # ---- parameter helpers ------------------------------------------------
    def add_param(self, name: str, shape, scale: Optional[float] = None) -> None:
        scale = scale if scale is not None else 1.0 / np.sqrt(shape[-1])
        self.params[name] = self.rng.normal(0, scale, size=shape)
        self._acc[name] = np.full(shape, 1e-8)

    def sparse_update(self, name: str, idx: np.ndarray, grad: np.ndarray) -> None:
        """AdaGrad row update; duplicate indices accumulate correctly."""
        acc, p = self._acc[name], self.params[name]
        np.add.at(acc, idx, grad**2)
        np.add.at(p, idx, -self.lr * grad / np.sqrt(acc[idx]))

    def dense_update(self, name: str, grad: np.ndarray) -> None:
        acc, p = self._acc[name], self.params[name]
        acc += grad**2
        p -= self.lr * grad / np.sqrt(acc)

    # ---- model interface --------------------------------------------------
    def score_triples(self, triples: np.ndarray) -> np.ndarray:
        """Plausibility scores for (n, 3) index triples; higher = better."""
        raise NotImplementedError

    def train_step(self, pos: np.ndarray, neg: np.ndarray) -> float:
        """One gradient step on a batch; returns the batch loss."""
        raise NotImplementedError

    def score_candidates(self, h: int, r: int, tails: bool = True) -> np.ndarray:
        """Scores of every entity as candidate tail (or head) — default
        implementation builds the full triple batch; models may
        specialize for speed."""
        cand = np.arange(self.n_ent, dtype=np.int32)
        fixed = np.full(self.n_ent, h, dtype=np.int32)
        rel = np.full(self.n_ent, r, dtype=np.int32)
        if tails:
            batch = np.stack([fixed, rel, cand], axis=1)
        else:
            batch = np.stack([cand, rel, fixed], axis=1)
        return self.score_triples(batch)

    # ---- training loop ----------------------------------------------------
    def fit(
        self,
        data: KGEDataset,
        epochs: int = 30,
        batch_size: int = 512,
        neg_k: int = 4,
        verbose: bool = False,
    ) -> "KGEModel":
        train = data.train
        for ep in range(epochs):
            order = self.rng.permutation(len(train))
            total = 0.0
            for s in range(0, len(train), batch_size):
                pos = train[order[s : s + batch_size]]
                neg = negative_sample(pos, self.n_ent, neg_k, self.rng, data.known)
                total += self.train_step(pos, neg)
            if verbose:
                print(f"[{self.name}] epoch {ep} loss {total:.3f}")
        return self


def margin_loss_grads(pos_d: np.ndarray, neg_d: np.ndarray, margin: float):
    """Margin ranking loss over distance scores (lower d = better).

    Positives are repeated to align with k negatives upstream; returns
    (loss, active mask) where active selects violating pairs.
    """
    viol = margin + pos_d - neg_d
    active = viol > 0
    return float(viol[active].sum()), active


def sigmoid(x: np.ndarray) -> np.ndarray:
    return 1.0 / (1.0 + np.exp(-np.clip(x, -30, 30)))


def bce_loss_grad(scores: np.ndarray, labels: np.ndarray):
    """Binary cross-entropy over logit scores → (loss, dL/dscore)."""
    p = sigmoid(scores)
    eps = 1e-9
    loss = -np.mean(labels * np.log(p + eps) + (1 - labels) * np.log(1 - p + eps))
    grad = (p - labels) / len(scores)
    return float(loss), grad
