"""PassJoin building blocks (Li et al. [36], as used by MassJoin [19]).

Pure-python helpers: the even partition scheme (Lemma 7 allows any
partition; even partitioning minimizes the chunk space, §III-D), and the
multi-match-aware substring windows that bound where a segment of the
indexed string may match inside the probing string.

Conventions: the *indexed* string ``y`` is the longer one (self-join
optimization §III-G.1 keeps only |x| <= |y|); ``tau`` is the maximum
allowed LD between the pair, so ``y`` is partitioned into ``tau + 1``
segments.
"""
from __future__ import annotations


def even_partition(length: int, n_segments: int) -> list[tuple[int, int]]:
    """Split ``[0, length)`` into ``n_segments`` contiguous segments whose
    lengths differ by at most one. Returns ``(start, seg_len)`` per
    segment; the last ``length % n_segments`` segments are the longer
    ones (PassJoin's convention)."""
    if n_segments <= 0:
        raise ValueError("n_segments must be positive")
    a, b = divmod(length, n_segments)
    out = []
    pos = 0
    for i in range(n_segments):
        seg_len = a + (1 if i >= n_segments - b else 0)
        out.append((pos, seg_len))
        pos += seg_len
    return out


def substring_window(
    lx: int, ly: int, tau: int, seg_index: int, p: int, seg_len: int
) -> tuple[int, int]:
    """Multi-match-aware start-position window (0-based, inclusive).

    For segment ``seg_index`` (0-based) of the indexed string ``y``
    (|y| = ly) starting at ``p`` with length ``seg_len``, any substring
    of the probe ``x`` (|x| = lx <= ly) equal to that segment on an
    LD <= tau alignment must start within the returned ``[lo, hi]``.
    Empty window is signalled by ``lo > hi``.

    Derivation (PassJoin §4.2): at most ``i`` errors can precede segment
    ``i+1``, and at most ``tau - i`` can follow it; combined with the
    length difference ``delta = lx - ly`` this gives
    ``max(p - i, p + delta - (tau - i)) <= start <= min(p + i, p + delta + (tau - i))``.
    """
    i = seg_index
    delta = lx - ly
    lo = max(0, p - i, p + delta - (tau - i))
    hi = min(lx - seg_len, p + i, p + delta + (tau - i))
    return lo, hi


def segments_of(y: str, tau: int) -> list[tuple[int, int, str]]:
    """The ``tau + 1`` even segments of ``y`` as ``(seg_index, start, chunk)``."""
    return [
        (i, start, y[start : start + seg_len])
        for i, (start, seg_len) in enumerate(even_partition(len(y), tau + 1))
    ]


def probe_substrings(x: str, ly: int, tau: int) -> list[tuple[int, str]]:
    """All ``(seg_index, chunk)`` substrings of the probe ``x`` that could
    match a segment of an indexed string of length ``ly``."""
    out = []
    lx = len(x)
    for i, (p, seg_len) in enumerate(even_partition(ly, tau + 1)):
        if seg_len == 0:
            continue
        lo, hi = substring_window(lx, ly, tau, i, p, seg_len)
        for s in range(lo, hi + 1):
            out.append((i, x[s : s + seg_len]))
    return out
