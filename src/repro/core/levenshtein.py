"""Character-level string distances: LD (Def. 1) and NLD (Def. 2).

LD is the classic Levenshtein distance (insert/delete/substitute, unit
cost). NLD is the Li-Liu normalization ``2*LD / (|x| + |y| + LD)`` which
is a metric on strings (Theorem 1 of the paper, proved in [37]).

``ld_banded`` is the thresholded variant used in the MassJoin verify
step: it answers "is LD(x, y) <= k?" in O(k * min(|x|,|y|)) time by only
filling a diagonal band of the DP matrix.
"""
from __future__ import annotations


def ld(x: str, y: str) -> int:
    """Exact Levenshtein distance between ``x`` and ``y`` (Def. 1)."""
    if x == y:
        return 0
    if not x:
        return len(y)
    if not y:
        return len(x)
    if len(x) > len(y):  # iterate over the shorter string's prefix row
        x, y = y, x
    prev = list(range(len(x) + 1))
    for j, cy in enumerate(y, start=1):
        cur = [j] + [0] * len(x)
        for i, cx in enumerate(x, start=1):
            cur[i] = min(
                prev[i] + 1,  # delete from y
                cur[i - 1] + 1,  # insert into y
                prev[i - 1] + (cx != cy),  # substitute
            )
        prev = cur
    return prev[-1]


def ld_banded(x: str, y: str, k: int) -> int | None:
    """Levenshtein distance if it is <= ``k``, else ``None``.

    Uses a banded DP of half-width ``k``; any cell outside the band
    cannot be on a path of cost <= k. ``k < 0`` always returns None.
    """
    if k < 0:
        return None
    lx, ly = len(x), len(y)
    if abs(lx - ly) > k:
        return None
    if x == y:
        return 0
    if lx > ly:
        x, y, lx, ly = y, x, ly, lx
    if lx == 0:  # band math assumes a non-empty shorter string
        return ly if ly <= k else None
    big = k + 1
    prev = [j if j <= k else big for j in range(lx + 1)]
    for j in range(1, ly + 1):
        cy = y[j - 1]
        lo = max(1, j - k)
        hi = min(lx, j + k)
        cur = [big] * (lx + 1)
        if j <= k:
            cur[0] = j
        for i in range(lo, hi + 1):
            cur[i] = min(
                prev[i] + 1,
                cur[i - 1] + 1,
                prev[i - 1] + (x[i - 1] != cy),
            )
        if min(cur[lo : hi + 1]) > k:  # whole band exceeded the budget
            return None
        prev = cur
    return prev[lx] if prev[lx] <= k else None


def nld(x: str, y: str) -> float:
    """Normalized Levenshtein Distance (Def. 2); a metric in [0, 1]."""
    if not x and not y:
        return 0.0
    d = ld(x, y)
    return 2.0 * d / (len(x) + len(y) + d)


def nld_from_ld(d: int, lx: int, ly: int) -> float:
    """NLD given a precomputed LD and the two string lengths."""
    if lx == 0 and ly == 0:
        return 0.0
    return 2.0 * d / (lx + ly + d)


def within_nld(x: str, y: str, t: float) -> int | None:
    """LD(x, y) if NLD(x, y) <= ``t``, else ``None``.

    ``NLD <= t``  iff  ``LD <= t*(|x|+|y|) / (2-t)``, so a banded LD with
    that integer budget decides the predicate without a full DP.
    """
    if t >= 1.0:
        return ld(x, y)
    budget = int(t * (len(x) + len(y)) / (2.0 - t))
    return ld_banded(x, y, budget)
