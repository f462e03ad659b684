"""Candidate de-duplication strategies (paper §III-G.3).

*grouping-on-both-strings*: the shuffle groups instances of the same
pair; the reducer emits the pair once — in DataFrame terms, a
``distinct()`` on the canonical pair (the verify stage then gets one
reduce group per pair).

*grouping-on-one-string*: one of the two strings becomes the reduce
key, chosen by the paper's hash-balancing rule
``int(HASH(τ) < HASH(v)) == (HASH(τ) + HASH(v)) % 2``; the reducer
de-duplicates its partner list with a hash set (and, in TSJ, verifies
its partners in the same pass — see :func:`repro.tsj.verify.verify_grouped`).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def dedup_both(cand: DataFrame) -> DataFrame:
    """Distinct canonical pairs: one reduce group per pair."""
    return cand.select("sid1", "sid2").distinct()


def with_group_key(cand: DataFrame) -> DataFrame:
    """Assign the grouping-on-one-string reduce key.

    Adds ``ksid`` (the key string) and ``vsid`` (the partner). The hash
    rule flips which side is the key pseudo-randomly per pair so that
    heavy hitters on either side spread across both roles; ``pmod``
    keeps the parity bit well-defined for negative hashes."""
    h1 = F.hash(F.col("sid1")).cast("long")  # long: h1+h2 must not overflow (ANSI)
    h2 = F.hash(F.col("sid2")).cast("long")
    take_first = (h1 < h2).cast("int") == F.pmod(h1 + h2, F.lit(2))
    return cand.select(
        F.when(take_first, F.col("sid1")).otherwise(F.col("sid2")).alias("ksid"),
        F.when(take_first, F.col("sid2")).otherwise(F.col("sid1")).alias("vsid"),
    )


def dedup_one(cand: DataFrame) -> DataFrame:
    """Reference grouping-on-one-string dedup: group by the key string,
    de-duplicate partners, re-emit canonical pairs. (The production TSJ
    pipeline fuses the dedup with verification; this standalone form is
    for tests and the dedup-equivalence property.)"""
    keyed = with_group_key(cand)
    return (
        keyed.groupBy("ksid")
        .agg(F.collect_set("vsid").alias("vs"))
        .select(F.col("ksid"), F.explode("vs").alias("vsid"))
        .select(
            F.least("ksid", "vsid").alias("sid1"),
            F.greatest("ksid", "vsid").alias("sid2"),
        )
    )
