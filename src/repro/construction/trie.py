"""Trie prefix tree for precise surface-string matching.

Sec. II-B(3): products are linked to Place/Brand "by jointly conducting
trie prefix tree precise matching and fuzzy matching of synonyms".  The
trie stores every known surface form (canonical names *and* registered
aliases) and answers exact and longest-prefix lookups in O(|query|).
It is small (vocabulary-sized), picklable, and shipped to executors via
Spark broadcast by :mod:`repro.construction.schema_mapping`.
"""
from __future__ import annotations

from typing import Dict, Iterable, List, Optional, Tuple


class Trie:
    """Character trie mapping surface strings to payload values."""

    __slots__ = ("_children", "_value", "_terminal")

    def __init__(self) -> None:
        self._children: Dict[str, "Trie"] = {}
        self._value: Optional[str] = None
        self._terminal: bool = False

    def insert(self, key: str, value: str) -> None:
        node = self
        for ch in key:
            node = node._children.setdefault(ch, Trie())
        node._terminal = True
        node._value = value

    def lookup(self, key: str) -> Optional[str]:
        """Exact-match payload, or None."""
        node = self
        for ch in key:
            node = node._children.get(ch)
            if node is None:
                return None
        return node._value if node._terminal else None

    def longest_prefix(self, query: str) -> Optional[Tuple[str, str]]:
        """(matched_prefix, payload) for the longest terminal prefix of
        ``query``, or None — how a matcher finds a brand name embedded at
        the start of a longer raw string."""
        node = self
        best: Optional[Tuple[str, str]] = None
        for i, ch in enumerate(query):
            node = node._children.get(ch)
            if node is None:
                break
            if node._terminal:
                best = (query[: i + 1], node._value)
        return best

    def __contains__(self, key: str) -> bool:
        return self.lookup(key) is not None

    def n_keys(self) -> int:
        n = 1 if self._terminal else 0
        return n + sum(c.n_keys() for c in self._children.values())

    @classmethod
    def from_pairs(cls, pairs: Iterable[Tuple[str, str]]) -> "Trie":
        t = cls()
        for k, v in pairs:
            t.insert(k, v)
        return t


def bounded_levenshtein(a: str, b: str, k: int) -> Optional[int]:
    """Edit distance(a, b) if it is <= k, else None — banded DP, O(|a|·k).

    Used by the fuzzy stage to absorb misspellings the synonym table
    does not list (the matcher keeps the *minimum*-distance candidate).
    Early-exits when a band row exceeds ``k``.
    """
    if abs(len(a) - len(b)) > k:
        return None
    prev: List[int] = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        cur = [i] + [0] * len(b)
        lo = max(1, i - k)
        hi = min(len(b), i + k)
        if lo > 1:
            cur[lo - 1] = k + 1
        for j in range(lo, hi + 1):
            cost = 0 if ca == b[j - 1] else 1
            cur[j] = min(prev[j] + 1, cur[j - 1] + 1, prev[j - 1] + cost)
        if hi < len(b):
            cur[hi + 1 :] = [k + 1] * (len(b) - hi)
        if min(cur[max(0, lo - 1) : hi + 1]) > k:
            return None
        prev = cur
    d = prev[len(b)]
    return d if d <= k else None


def levenshtein_leq(a: str, b: str, k: int) -> bool:
    """True iff edit distance(a, b) <= k."""
    return bounded_levenshtein(a, b, k) is not None
