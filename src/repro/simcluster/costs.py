"""Derive per-reduce-group cost tables for the cluster simulator from an
actual TSJ / HMJ run (DESIGN.md §3, machine-scaling substitution).

Costs are abstract *work units* grounded in the paper's own complexity
formulas: a verification of a pair costs ``L(x)*L(y) + k^3`` for
fuzzy-token-matching (§III-F) or ``L(x)*L(y) + TxTy*log(TxTy)`` for
greedy-token-aligning (§III-G.5); shuffle-side stages are charged per
emitted record. The per-group worker-instantiation overhead — the
paper's stated explanation for grouping-on-one-string beating
grouping-on-both-strings — and the fixed stage startup are calibration
constants reported in EXPERIMENTS.md.
"""
from __future__ import annotations

import math

import numpy as np
import pandas as pd

from repro.core.bounds import max_index_length, segment_count
from repro.simcluster.model import ClusterSim
from repro.tsj.joiner import TSJArtifacts
from repro.tsj.passjoin import even_partition, substring_window

# Calibration constants (see EXPERIMENTS.md "Simulator calibration"):
# chosen once so that, at the reference N=20k / T=0.1 / M=100 corpus, the
# simulated Fig-1 curves land in the paper's observed envelope (speedup
# ~3.8 at 10x machines; grouping-on-one-string 13-32% faster). They are
# NOT fit per-experiment.
DEFAULT_GROUP_OVERHEAD = 300.0  # work units to instantiate one reduce worker
DEFAULT_STAGE_STARTUP = 6000.0  # fixed per-stage job overhead


def verify_cost(l1: int, l2: int, n1: int, n2: int, align: str) -> float:
    """Per-pair verification cost from the paper's complexity formulas."""
    if align == "greedy":
        e = n1 * n2
        return l1 * l2 + e * math.log2(e + 1)
    k = max(n1, n2)
    return l1 * l2 + k**3


def _chunk_emissions(tok_len: int, t: float) -> float:
    """Map-side records one token emits in MassJoin: its segments plus
    all probe substrings across feasible indexed lengths."""
    n = segment_count(tok_len, t)
    total = float(n)
    for ly in range(tok_len, max_index_length(tok_len, t) + 1):
        tau = segment_count(ly, t) - 1
        for i, (p, seg_len) in enumerate(even_partition(ly, tau + 1)):
            if seg_len == 0:
                continue
            lo, hi = substring_window(tok_len, ly, tau, i, p, seg_len)
            if hi >= lo:
                total += hi - lo + 1
    return total


def tsj_cluster_sim(
    tokens_pdf: pd.DataFrame,
    token_pairs_pdf: pd.DataFrame | None,
    cand_counts_pdf: pd.DataFrame,
    meta_pdf: pd.DataFrame,
    *,
    t: float,
    variant: str,
    dedup: str,
    group_overhead: float = DEFAULT_GROUP_OVERHEAD,
    stage_startup: float = DEFAULT_STAGE_STARTUP,
) -> ClusterSim:
    """Build the simulator for one TSJ configuration.

    Inputs (all pandas):
    - ``tokens_pdf``: kept tokens ``(tok, len, df)``;
    - ``token_pairs_pdf``: MassJoin output ``(tok1, tok2)`` or None for
      the exact-token-matching variant;
    - ``cand_counts_pdf``: filtered candidates ``(sid1, sid2, n)`` where
      ``n`` is the duplicate multiplicity pre-dedup;
    - ``meta_pdf``: ``(sid, l, nt)`` per string.
    """
    align = "greedy" if variant == "greedy" else "hungarian"
    sim = ClusterSim()
    df = tokens_pdf["df"].to_numpy(dtype=float)

    # Stage: token space / document frequency (groups = tokens).
    sim.add_stage("token_space", df, per_group_overhead=group_overhead,
                  startup=stage_startup)

    if variant != "exact":
        # Stage: MassJoin map+shuffle (groups = tokens; cost = emissions).
        emis = np.array([_chunk_emissions(int(l), t) for l in tokens_pdf["len"]])
        sim.add_stage("massjoin", emis, per_group_overhead=group_overhead,
                      startup=stage_startup)
        # Stage: token-pair verification (groups = similar token pairs).
        if token_pairs_pdf is not None and len(token_pairs_pdf):
            tv = (token_pairs_pdf["tok1"].str.len()
                  * token_pairs_pdf["tok2"].str.len()).to_numpy(dtype=float)
        else:
            tv = np.array([])
        sim.add_stage("token_verify", tv, per_group_overhead=group_overhead,
                      startup=stage_startup)

    # Stage: shared-token candidate generation (groups = tokens).
    sim.add_stage("candgen_shared", df * (df - 1) / 2.0,
                  per_group_overhead=group_overhead, startup=stage_startup)

    if variant != "exact" and token_pairs_pdf is not None:
        dfm = dict(zip(tokens_pdf["tok"], tokens_pdf["df"]))
        cg = np.array(
            [
                dfm.get(a, 0) * dfm.get(b, 0)
                for a, b in zip(token_pairs_pdf["tok1"], token_pairs_pdf["tok2"])
            ],
            dtype=float,
        )
        sim.add_stage("candgen_similar", cg, per_group_overhead=group_overhead,
                      startup=stage_startup)

    # Stage: dedup + verify. Group granularity is the whole point of Fig 1.
    lmap = dict(zip(meta_pdf["sid"], meta_pdf["l"]))
    nmap = dict(zip(meta_pdf["sid"], meta_pdf["nt"]))
    cc = cand_counts_pdf
    pair_cost = np.array(
        [
            verify_cost(lmap[a], lmap[b], nmap[a], nmap[b], align)
            for a, b in zip(cc["sid1"], cc["sid2"])
        ],
        dtype=float,
    )
    dup = cc["n"].to_numpy(dtype=float)
    if dedup == "both":
        # One reduce group per candidate pair: dedup shuffle reads the
        # duplicates, then one verification.
        sim.add_stage("dedup_verify", dup + pair_cost,
                      per_group_overhead=group_overhead, startup=stage_startup,
                      group_keys=_pair_keys(cc))
    else:
        # One reduce group per key string (paper's hash-balancing rule):
        # the group absorbs all duplicate instances (hash-set inserts)
        # plus one verification per distinct partner.
        key = _one_string_key(cc)
        g = pd.DataFrame({"key": key, "work": dup + pair_cost})
        grouped = g.groupby("key")["work"].sum()
        sim.add_stage("dedup_verify", grouped.to_numpy(),
                      per_group_overhead=group_overhead, startup=stage_startup,
                      group_keys=grouped.index.to_numpy(dtype=np.uint64))
    return sim


def _pair_keys(cc: pd.DataFrame) -> np.ndarray:
    return (cc["sid1"].to_numpy(dtype=np.uint64) * np.uint64(1_000_003)
            + cc["sid2"].to_numpy(dtype=np.uint64))


def _one_string_key(cc: pd.DataFrame) -> np.ndarray:
    """The §III-G.3 hash rule, mirrored from repro.tsj.dedup in numpy."""
    s1 = cc["sid1"].to_numpy(dtype=np.int64)
    s2 = cc["sid2"].to_numpy(dtype=np.int64)
    h1 = (s1 * 2654435761) & 0xFFFFFFFF
    h2 = (s2 * 2654435761) & 0xFFFFFFFF
    take_first = (h1 < h2).astype(np.int64) == ((h1 + h2) % 2)
    return np.where(take_first, s1, s2).astype(np.uint64)


def hmj_cluster_sim(
    replicas_pdf: pd.DataFrame,
    *,
    n_strings: int,
    n_centroids: int,
    avg_l: float,
    group_overhead: float = DEFAULT_GROUP_OVERHEAD,
    stage_startup: float = DEFAULT_STAGE_STARTUP,
) -> ClusterSim:
    """Simulator for the HMJ baseline.

    Stage 1 (assign): every string computes NSLD to every centroid —
    groups = strings, cost = K * avg_l^2 (the bigraph construction
    dominates). Stage 2 (join): groups = partitions; each partition of
    size s performs ~s^2/2 pair examinations. Most examinations die in
    the cheap prunes (length, centroid triangle, histogram), charged at
    2 work units each; the few surviving NSLD computations are folded
    into that constant (calibrated once, see EXPERIMENTS.md).
    """
    sim = ClusterSim()
    assign = np.full(n_strings, n_centroids * avg_l * avg_l)
    sim.add_stage("assign", assign, per_group_overhead=group_overhead,
                  startup=stage_startup)
    sizes = replicas_pdf.groupby("part")["sid"].count().to_numpy(dtype=float)
    per_pair = 2.0
    sim.add_stage("partition_join", per_pair * sizes * (sizes - 1) / 2.0,
                  per_group_overhead=group_overhead, startup=stage_startup)
    return sim
