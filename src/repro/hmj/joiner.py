"""Hybrid Metric Joiner (HMJ) — the paper's metric-space baseline
(§V-E), an in-house hybrid of ClusterJoin [53] and MR-MAPSS [68].

Pipeline (as described in the paper):
1. sample K centroid strings; every string's *home* partition is its
   nearest centroid under NSLD (Voronoi dissection);
2. replicate a string to every partition whose centroid is within
   ``d(home) + 2T`` — the general filter of [53]: if ``d(x, y) <= T``
   then ``y`` is present in home(x) (triangle inequality, see
   DESIGN.md §4.6), so no true pair is lost;
3. per partition, all-pairs with the Lemma-6 length filter, the
   centroid triangle prune ``|d(x,c) - d(y,c)| > T``, and the
   histogram lower bound, then exact NSLD; oversized partitions are
   recursively split with sub-centroids ([68]) inside the reducer;
4. pairs are emitted only from the home partition of an endpoint and
   de-duplicated globally.

NSLD's range [0, 1] makes names that share no tokens sit at distance
~1 from *every* centroid, so replication explodes and partitions stay
dense — the exact pathology the paper blames for HMJ's Fig-7 numbers.
"""
from __future__ import annotations

from collections.abc import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    DoubleType,
    IntegerType,
    LongType,
    StringType,
    StructField,
    StructType,
)

from repro.core.bounds import length_filter_ok, nsld_lower_bound
from repro.core.sld import nsld
from repro.tsj.tokens import build_strings

RESULT_SCHEMA = StructType(
    [
        StructField("sid1", LongType()),
        StructField("sid2", LongType()),
        StructField("nsld", DoubleType()),
    ]
)


def sample_centroids(strings: DataFrame, k: int, seed: int) -> list[list[str]]:
    """K centroid token-lists sampled uniformly from the corpus."""
    rows = (
        strings.select("tokens")
        .orderBy(F.md5(F.concat(F.lit(seed), F.col("sid").cast("string"))))
        .limit(k)
        .collect()
    )
    return [list(r["tokens"]) for r in rows]


def _assign_replicas(
    batches: Iterator[pd.DataFrame], centroids: list[list[str]], t: float
) -> Iterator[pd.DataFrame]:
    for pdf in batches:
        rows = []
        for sid, toks, l in zip(pdf["sid"], pdf["tokens"], pdf["l"]):
            toks = list(toks)
            dists = [nsld(toks, c) for c in centroids]
            home = int(np.argmin(dists))
            limit = dists[home] + 2.0 * t
            for j, dj in enumerate(dists):
                if dj <= limit + 1e-12:
                    rows.append((j, sid, " ".join(toks), int(l), dj, int(j == home)))
        yield pd.DataFrame(
            rows, columns=["part", "sid", "name", "l", "dist", "at_home"]
        )


def _join_partition(pdf: pd.DataFrame, t: float, max_partition: int) -> pd.DataFrame:
    """All-pairs within one partition with pruning; recursive sub-split
    of oversized groups via local sub-centroids (MR-MAPSS style)."""
    toks = [nm.split(" ") for nm in pdf["name"]]
    sids = pdf["sid"].to_numpy()
    ls = pdf["l"].to_numpy()
    dist = pdf["dist"].to_numpy()
    home = pdf["at_home"].to_numpy()
    hists = [sorted(len(tk) for tk in ts) for ts in toks]
    n = len(pdf)

    def allpairs(idx: np.ndarray, cdist: np.ndarray) -> list[tuple[int, int, float]]:
        out = []
        for a in range(len(idx)):
            i = idx[a]
            for b in range(a + 1, len(idx)):
                j = idx[b]
                if not (home[i] or home[j]):
                    continue  # pair is owned by some other partition
                if abs(cdist[a] - cdist[b]) > t + 1e-12:
                    continue  # centroid triangle prune
                if not length_filter_ok(int(ls[i]), int(ls[j]), t):
                    continue
                if nsld_lower_bound(hists[i], hists[j]) > t + 1e-12:
                    continue
                v = nsld(toks[i], toks[j])
                if v <= t + 1e-12:
                    a_, b_ = (int(sids[i]), int(sids[j]))
                    out.append((min(a_, b_), max(a_, b_), v))
        return out

    def recurse(idx: np.ndarray, cdist: np.ndarray, depth: int) -> list:
        if len(idx) <= max_partition or depth >= 3:
            return allpairs(idx, cdist)
        # sub-centroids: deterministic sample from the group
        rng = np.random.default_rng(len(idx) * 31 + depth)
        k = max(2, int(np.sqrt(len(idx) / max_partition)) + 1)
        subs = rng.choice(idx, size=min(k, len(idx)), replace=False)
        sub_toks = [toks[s] for s in subs]
        out = []
        buckets: dict[int, list[int]] = {}
        bdist: dict[int, list[float]] = {}
        for i in idx:
            ds = [nsld(toks[i], c) for c in sub_toks]
            h = int(np.argmin(ds))
            lim = ds[h] + 2.0 * t
            for j, dj in enumerate(ds):
                if dj <= lim + 1e-12:
                    buckets.setdefault(j, []).append(i)
                    bdist.setdefault(j, []).append(dj)
        seen = set()
        for j, members in buckets.items():
            if len(members) >= len(idx):  # split made no progress
                out.extend(allpairs(np.array(members), np.array(bdist[j])))
                break
            for p in recurse(np.array(members), np.array(bdist[j]), depth + 1):
                if (p[0], p[1]) not in seen:
                    seen.add((p[0], p[1]))
                    out.append(p)
        return out

    rows = recurse(np.arange(n), dist, 0)
    return pd.DataFrame(rows, columns=["sid1", "sid2", "nsld"])


def hmj_join(
    spark: SparkSession,
    names: DataFrame,
    *,
    t: float = 0.1,
    n_centroids: int = 8,
    max_partition: int = 4000,
    seed: int = 0,
    return_replicas: bool = False,
):
    """NSLD self-join via the metric-space baseline. Returns the verified
    pairs ``(sid1, sid2, nsld)``; with ``return_replicas``, also the
    replica table (for partition-size accounting in the Fig-7 bench)."""
    strings = build_strings(spark, names)
    strings.cache()
    centroids = sample_centroids(strings, n_centroids, seed)

    replica_schema = StructType(
        [
            StructField("part", IntegerType()),
            StructField("sid", LongType()),
            StructField("name", StringType()),
            StructField("l", IntegerType()),
            StructField("dist", DoubleType()),
            StructField("at_home", IntegerType()),
        ]
    )
    replicas = strings.select("sid", "tokens", "l").mapInPandas(
        lambda it: _assign_replicas(it, centroids, t), schema=replica_schema
    )
    replicas.cache()

    result = (
        replicas.groupBy("part")
        .applyInPandas(
            lambda pdf: _join_partition(pdf, t, max_partition), schema=RESULT_SCHEMA
        )
        .dropDuplicates(["sid1", "sid2"])
    )
    if return_replicas:
        return result, replicas
    return result
