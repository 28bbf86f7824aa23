"""Triple indexing and negative sampling for KGE training."""
from __future__ import annotations

import dataclasses
from typing import Dict, List, Optional, Set, Tuple

import numpy as np
import pandas as pd

from repro.benchmark.build import Benchmark


@dataclasses.dataclass
class KGEDataset:
    """Integer-indexed view of one benchmark.

    ``train``/``dev``/``test`` are (n, 3) int32 arrays of
    (head, relation, tail) indices.  ``known`` holds every true triple
    across all splits — the *filtered* evaluation protocol removes these
    from candidate rankings.
    """

    entities: List[str]
    relations: List[str]
    train: np.ndarray
    dev: np.ndarray
    test: np.ndarray
    ent_idx: Dict[str, int]
    rel_idx: Dict[str, int]
    known: Set[Tuple[int, int, int]]

    @property
    def n_ent(self) -> int:
        return len(self.entities)

    @property
    def n_rel(self) -> int:
        return len(self.relations)

    @classmethod
    def from_frames(
        cls,
        train: pd.DataFrame,
        dev: pd.DataFrame,
        test: pd.DataFrame,
    ) -> "KGEDataset":
        all_pdf = pd.concat([train, dev, test], ignore_index=True)
        entities = sorted(set(all_pdf["h"]) | set(all_pdf["t"]))
        relations = sorted(set(all_pdf["r"]))
        ent_idx = {e: i for i, e in enumerate(entities)}
        rel_idx = {r: i for i, r in enumerate(relations)}

        def enc(df: pd.DataFrame) -> np.ndarray:
            if len(df) == 0:
                return np.zeros((0, 3), dtype=np.int32)
            return np.stack(
                [
                    df["h"].map(ent_idx).to_numpy(np.int32),
                    df["r"].map(rel_idx).to_numpy(np.int32),
                    df["t"].map(ent_idx).to_numpy(np.int32),
                ],
                axis=1,
            )

        tr, dv, te = enc(train), enc(dev), enc(test)
        known = {tuple(row) for row in np.concatenate([tr, dv, te]).tolist()}
        return cls(entities, relations, tr, dv, te, ent_idx, rel_idx, known)

    @classmethod
    def from_benchmark(cls, bench: Benchmark) -> "KGEDataset":
        return cls.from_frames(bench.train_pdf, bench.dev_pdf, bench.test_pdf)

    def filtered_targets(self) -> Tuple[Dict, Dict]:
        """(h,r)→{t} and (r,t)→{h} lookup of all known triples."""
        by_hr: Dict[Tuple[int, int], Set[int]] = {}
        by_rt: Dict[Tuple[int, int], Set[int]] = {}
        for h, r, t in self.known:
            by_hr.setdefault((h, r), set()).add(t)
            by_rt.setdefault((r, t), set()).add(h)
        return by_hr, by_rt


def negative_sample(
    pos: np.ndarray, n_ent: int, k: int, rng: np.random.Generator,
    known: Optional[Set[Tuple[int, int, int]]] = None,
) -> np.ndarray:
    """k negatives per positive by corrupting head or tail (50/50).

    With ``known`` given, corruptions that collide with true triples are
    re-drawn once (best-effort filtering — standard practice).
    """
    n = len(pos)
    neg = np.repeat(pos, k, axis=0)
    corrupt_tail = rng.random(n * k) < 0.5
    repl = rng.integers(0, n_ent, n * k)
    neg[corrupt_tail, 2] = repl[corrupt_tail]
    neg[~corrupt_tail, 0] = repl[~corrupt_tail]
    if known is not None:
        for i in range(len(neg)):
            if tuple(neg[i]) in known:
                col = 2 if corrupt_tail[i] else 0
                neg[i, col] = rng.integers(0, n_ent)
    return neg
