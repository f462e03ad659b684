"""Brute-force all-pairs NSLD self-join — the test oracle for TSJ.

O(N^2) in pure python over a pandas corpus; only usable at unit-test
scale, which is exactly its job: every completeness/precision property
of the distributed pipeline is asserted against this reference.
"""
from __future__ import annotations

import pandas as pd

from repro.core.sld import agg_length, nsld_from_sld, sld
from repro.core.tokenize import tokenize


def naive_nsld_selfjoin(names: pd.DataFrame, t: float) -> pd.DataFrame:
    """All pairs ``(sid1, sid2, sld, nsld)`` with ``NSLD <= t`` over a
    ``(sid, name)`` pandas corpus. Pairs are canonical (sid1 < sid2);
    rows tokenizing to the empty multiset are excluded (matching
    :func:`repro.tsj.tokens.build_strings`)."""
    toks = {
        sid: tokenize(name)
        for sid, name in zip(names["sid"], names["name"])
        if tokenize(name)
    }
    lens = {sid: agg_length(ts) for sid, ts in toks.items()}
    sids = sorted(toks)
    rows = []
    for i, a in enumerate(sids):
        la = lens[a]
        for b in sids[i + 1 :]:
            lb = lens[b]
            # cheap Lemma-6 prescreen (admissible, tested in test_bounds)
            lo, hi = (la, lb) if la <= lb else (lb, la)
            if hi > 0 and 1.0 - lo / hi > t + 1e-12:
                continue
            s = sld(toks[a], toks[b])
            v = nsld_from_sld(s, la, lb)
            if v <= t + 1e-12:
                rows.append((a, b, s, v))
    return pd.DataFrame(rows, columns=["sid1", "sid2", "sld", "nsld"])
