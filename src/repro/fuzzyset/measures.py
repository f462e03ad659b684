"""Weighted set-based fuzzy similarity measures (Wang et al. [67]),
used by the paper's Fig-6 accuracy study: FJaccard, FCosine, FDice.

Two tokens may *fuzzily match* when their similarity ``1 - NLD`` is at
least the token threshold ``delta`` (the T1 of [67]; the paper's
critique is precisely that this second, unrelated threshold must be
tuned). The fuzzy overlap is a greedy maximum-similarity matching;
each matched pair contributes ``sim * (w(t1) + w(t2)) / 2`` where
``w`` is the idf weight ``ln(1 + N / df)``.
"""
from __future__ import annotations

import math
from collections import Counter
from collections.abc import Mapping, Sequence

from repro.core.levenshtein import nld

DEFAULT_DELTA = 0.8


def idf_weights(df: Mapping[str, int], n_docs: int) -> dict[str, float]:
    """idf weight per token given document frequencies."""
    return {t: math.log(1.0 + n_docs / d) for t, d in df.items() if d > 0}


def _w(weights: Mapping[str, float], tok: str) -> float:
    # Unknown tokens get the weight of a df=1 token (maximally rare).
    return weights.get(tok, max(weights.values()) if weights else 1.0)


def weighted_size(toks: Sequence[str], weights: Mapping[str, float]) -> float:
    """w(x): total idf weight of the token multiset."""
    return sum(_w(weights, t) for t in toks)


def fuzzy_overlap(
    toks1: Sequence[str],
    toks2: Sequence[str],
    weights: Mapping[str, float],
    delta: float = DEFAULT_DELTA,
) -> float:
    """Greedy max-similarity one-to-one matching ([67]'s fuzzy overlap).

    Exactly equal tokens match first (sim 1); remaining tokens match
    greedily by descending ``1 - NLD`` subject to ``sim >= delta``.
    """
    c1, c2 = Counter(toks1), Counter(toks2)
    overlap = 0.0
    for t in list(c1.keys() & c2.keys()):  # exact matches first
        k = min(c1[t], c2[t])
        overlap += k * _w(weights, t)
        c1[t] -= k
        c2[t] -= k
    rest1 = list(c1.elements())
    rest2 = list(c2.elements())
    edges = []
    for i, a in enumerate(rest1):
        for j, b in enumerate(rest2):
            sim = 1.0 - nld(a, b)
            if sim >= delta:
                edges.append((sim, i, j))
    edges.sort(key=lambda e: (-e[0], e[1], e[2]))
    used1: set[int] = set()
    used2: set[int] = set()
    for sim, i, j in edges:
        if i in used1 or j in used2:
            continue
        used1.add(i)
        used2.add(j)
        overlap += sim * (_w(weights, rest1[i]) + _w(weights, rest2[j])) / 2.0
    return overlap


def fjaccard(toks1, toks2, weights, delta: float = DEFAULT_DELTA) -> float:
    """Weighted fuzzy Jaccard similarity in [0, 1]."""
    o = fuzzy_overlap(toks1, toks2, weights, delta)
    denom = weighted_size(toks1, weights) + weighted_size(toks2, weights) - o
    return o / denom if denom > 0 else 1.0


def fcosine(toks1, toks2, weights, delta: float = DEFAULT_DELTA) -> float:
    """Weighted fuzzy cosine similarity in [0, 1]."""
    o = fuzzy_overlap(toks1, toks2, weights, delta)
    denom = math.sqrt(weighted_size(toks1, weights) * weighted_size(toks2, weights))
    return min(1.0, o / denom) if denom > 0 else 1.0


def fdice(toks1, toks2, weights, delta: float = DEFAULT_DELTA) -> float:
    """Weighted fuzzy Dice similarity in [0, 1]."""
    o = fuzzy_overlap(toks1, toks2, weights, delta)
    denom = weighted_size(toks1, weights) + weighted_size(toks2, weights)
    return min(1.0, 2.0 * o / denom) if denom > 0 else 1.0
