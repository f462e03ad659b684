"""Pruning bounds from the paper: Lemmas 3, 6, 8, 9, 10 and the
token-length-histogram SLD lower bound used by the distance filter
(§III-E.2; the paper defers the exact algorithm, see DESIGN.md §4.5).

All functions are pure so they can run inside pandas UDFs and be
property-tested against the exact distances.
"""
from __future__ import annotations

from collections.abc import Sequence


def ld_upper_bound(lx: int, ly: int, t: float) -> int:
    """Lemma 8: max LD(x, y) consistent with NLD(x, y) <= t.

    ``lx``/``ly`` are the string lengths. The bound is
    floor(2*t*ly / (2-t)) when lx <= ly, floor(t*ly / (1-t)) otherwise.
    """
    if lx <= ly:
        return int(2.0 * t * ly / (2.0 - t))
    return int(t * ly / (1.0 - t))


def segment_count(ly: int, t: float) -> int:
    """Number of PassJoin segments, U+1, for an indexed string of length
    ``ly`` under NLD threshold ``t`` (self-join: only |x| <= |y| arises,
    so U = floor(2*t*ly/(2-t)) per Lemma 8 / §III-G.1)."""
    return ld_upper_bound(ly, ly, t) + 1


def min_probe_length(ly: int, t: float) -> int:
    """Lemma 9: ceil((1-t)*ly) <= |x| for any x with NLD(x, y) <= t and
    |x| <= |y| = ``ly``."""
    import math

    return math.ceil((1.0 - t) * ly)


def max_index_length(lx: int, t: float) -> int:
    """Largest ly such that a probe of length ``lx`` can satisfy the
    Lemma-9 length condition ceil((1-t)*ly) <= lx.

    Computed directly (ly <= lx/(1-t)) then corrected for the ceiling.
    """
    if t >= 1.0:
        raise ValueError("t must be < 1")
    ly = int(lx / (1.0 - t)) + 1
    while min_probe_length(ly, t) > lx:
        ly -= 1
    return ly


def length_filter_ok(lx: int, ly: int, t: float) -> bool:
    """Lemma 6 string-pair filter: 1 - min/max <= NSLD, so a pair can be
    similar only if min(L) >= (1-t) * max(L). ``lx``/``ly`` here are the
    *aggregate* token lengths of the two tokenized strings."""
    lo, hi = (lx, ly) if lx <= ly else (ly, lx)
    if hi == 0:
        return True
    return 1.0 - (lo / hi) <= t


def ld_lower_bound_unmatched(lx: int, ly: int, t: float) -> int:
    """Lemma 10: min LD(x, y) consistent with NLD(x, y) > t (exclusive
    bound; actual LD is strictly greater than the returned value)."""
    if lx <= ly:
        return int(t * ly / (2.0 - t))
    return int(2.0 * t * ly / (2.0 - t))


def sld_lower_bound(len_hist_x: Sequence[int], len_hist_y: Sequence[int]) -> int:
    """Admissible SLD lower bound from token-length histograms alone.

    ``LD(a, b) >= ||a| - |b||`` for any tokens, and the min-cost perfect
    matching under cost ``|la - lb|`` over two sorted, zero-padded length
    lists is the in-order pairing (rearrangement inequality on the line).
    Hence SLD >= sum_i |sorted(x)_i - sorted(y)_i|.
    """
    k = max(len(len_hist_x), len(len_hist_y))
    xs = sorted(len_hist_x) + [0] * (k - len(len_hist_x))
    ys = sorted(len_hist_y) + [0] * (k - len(len_hist_y))
    xs.sort()
    ys.sort()
    return sum(abs(a - b) for a, b in zip(xs, ys))


def nsld_lower_bound(len_hist_x: Sequence[int], len_hist_y: Sequence[int]) -> float:
    """NSLD lower bound induced by :func:`sld_lower_bound` (NSLD is
    monotone increasing in SLD for fixed aggregate lengths)."""
    s = sld_lower_bound(len_hist_x, len_hist_y)
    lx = sum(len_hist_x)
    ly = sum(len_hist_y)
    if lx == 0 and ly == 0:
        return 0.0
    return 2.0 * s / (lx + ly + s)
