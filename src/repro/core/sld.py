"""Setwise Levenshtein Distance (Def. 3) and its normalization (Def. 4).

SLD(x^t, y^t) pads the shorter token multiset with empty tokens to a
common size k, builds the k x k bigraph weighted by token-level LD
(``LD(a, "") = |a|``), and takes the minimum-weight perfect matching —
the allowed edits never merge or split tokens, so every optimal
transformation is a token-to-token assignment (paper §III-F).

``sld_greedy`` is the greedy-token-aligning approximation (§III-G.5):
repeatedly commit the globally minimum remaining edge. It upper-bounds
the true SLD, so pairs accepted under a greedy-NSLD threshold are truly
similar (precision stays 1.0; only recall can drop).
"""
from __future__ import annotations

from collections.abc import Sequence

from repro.core.hungarian import assignment_min_cost
from repro.core.levenshtein import ld


def agg_length(tokens: Sequence[str]) -> int:
    """L(x^t): aggregate character length of the tokens (paper §II-A)."""
    return sum(len(t) for t in tokens)


def cost_bigraph(xt: Sequence[str], yt: Sequence[str]) -> list[list[int]]:
    """The k x k token-LD weight matrix over the ε-padded multisets."""
    k = max(len(xt), len(yt), 1)
    xs = list(xt) + [""] * (k - len(xt))
    ys = list(yt) + [""] * (k - len(yt))
    return [[ld(a, b) for b in ys] for a in xs]


def sld(xt: Sequence[str], yt: Sequence[str]) -> int:
    """Exact SLD via minimum-weight perfect matching (fuzzy-token-matching)."""
    if not xt and not yt:
        return 0
    total, _ = assignment_min_cost(cost_bigraph(xt, yt))
    return int(round(total))


def sld_greedy(xt: Sequence[str], yt: Sequence[str]) -> int:
    """Greedy-token-aligning upper bound on SLD (§III-G.5).

    Edges are consumed in (weight, i, j) order for determinism.
    """
    if not xt and not yt:
        return 0
    w = cost_bigraph(xt, yt)
    k = len(w)
    edges = sorted((w[i][j], i, j) for i in range(k) for j in range(k))
    used_x = [False] * k
    used_y = [False] * k
    total = 0
    matched = 0
    for c, i, j in edges:
        if used_x[i] or used_y[j]:
            continue
        used_x[i] = True
        used_y[j] = True
        total += c
        matched += 1
        if matched == k:
            break
    return total


def nsld_from_sld(s: int, lx: int, ly: int) -> float:
    """NSLD given SLD and the two aggregate lengths (Def. 4)."""
    if lx == 0 and ly == 0:
        return 0.0
    return 2.0 * s / (lx + ly + s)


def nsld(xt: Sequence[str], yt: Sequence[str]) -> float:
    """Exact Normalized Setwise Levenshtein Distance; a metric in [0, 1]."""
    return nsld_from_sld(sld(xt, yt), agg_length(xt), agg_length(yt))


def nsld_greedy(xt: Sequence[str], yt: Sequence[str]) -> float:
    """NSLD computed from the greedy SLD upper bound (>= true NSLD)."""
    return nsld_from_sld(sld_greedy(xt, yt), agg_length(xt), agg_length(yt))
