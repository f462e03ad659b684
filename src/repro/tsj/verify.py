"""Final verification (paper §III-F): compute SLD on the surviving
candidate pairs and keep those with NSLD <= T.

Two physical shapes, matching the two dedup strategies:

- :func:`verify_pairs` — one unit of work per (already de-duplicated)
  pair: the grouping-on-both-strings reducer.
- :func:`verify_grouped` — one unit of work per key string: the
  grouping-on-one-string reducer, which de-duplicates its partner list
  with a hash set and verifies each partner (§III-G.3).

``align`` selects fuzzy-token-matching (exact SLD via the Hungarian
algorithm) or greedy-token-aligning (§III-G.5). Greedy upper-bounds the
true SLD, so precision remains 1.0 and only recall can drop.
"""
from __future__ import annotations

from collections.abc import Iterator

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import (
    DoubleType,
    IntegerType,
    LongType,
    StructField,
    StructType,
)

from repro.core.sld import nsld_from_sld, sld, sld_greedy

RESULT_SCHEMA = StructType(
    [
        StructField("sid1", LongType()),
        StructField("sid2", LongType()),
        StructField("sld", IntegerType()),
        StructField("nsld", DoubleType()),
    ]
)


def _sld_fn(align: str):
    if align == "hungarian":
        return sld
    if align == "greedy":
        return sld_greedy
    raise ValueError(f"unknown align: {align!r}")


def attach_tokens(pairs: DataFrame, strings: DataFrame) -> DataFrame:
    """Resolve both string ids to their token arrays and aggregate
    lengths (the id -> string resolution step of §III-F)."""
    s1 = strings.select(
        F.col("sid").alias("sid1"),
        F.col("tokens").alias("tokens1"),
        F.col("l").alias("l1"),
    )
    s2 = strings.select(
        F.col("sid").alias("sid2"),
        F.col("tokens").alias("tokens2"),
        F.col("l").alias("l2"),
    )
    return pairs.join(s1, "sid1").join(s2, "sid2")


def verify_pairs(pairs_with_tokens: DataFrame, t: float, align: str) -> DataFrame:
    """Grouping-on-both-strings verification: one SLD per input row."""
    f = _sld_fn(align)

    def gen(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            rows = []
            for sid1, sid2, tk1, tk2, l1, l2 in zip(
                pdf["sid1"], pdf["sid2"], pdf["tokens1"], pdf["tokens2"],
                pdf["l1"], pdf["l2"],
            ):
                s = f(list(tk1), list(tk2))
                v = nsld_from_sld(s, int(l1), int(l2))
                if v <= t + 1e-12:
                    rows.append((sid1, sid2, s, v))
            yield pd.DataFrame(rows, columns=["sid1", "sid2", "sld", "nsld"])

    return pairs_with_tokens.mapInPandas(gen, schema=RESULT_SCHEMA)


def verify_grouped(keyed_with_tokens: DataFrame, t: float, align: str) -> DataFrame:
    """Grouping-on-one-string verification.

    Input columns: ``ksid, vsid, ktokens, kl, vtokens, vl`` (one row per
    candidate instance, duplicates included). Each reduce group is one
    key string; the reducer drops duplicate partners via a hash set,
    then verifies each surviving partner — the §III-G.3 one-string
    reducer fused with §III-F verification."""
    f = _sld_fn(align)

    def reduce_group(pdf: pd.DataFrame) -> pd.DataFrame:
        ktokens = list(pdf["ktokens"].iloc[0])
        kl = int(pdf["kl"].iloc[0])
        ksid = int(pdf["ksid"].iloc[0])
        seen: set[int] = set()
        rows = []
        for vsid, vtokens, vl in zip(pdf["vsid"], pdf["vtokens"], pdf["vl"]):
            if vsid in seen:
                continue
            seen.add(vsid)
            s = f(ktokens, list(vtokens))
            v = nsld_from_sld(s, kl, int(vl))
            if v <= t + 1e-12:
                a, b = (ksid, vsid) if ksid < vsid else (vsid, ksid)
                rows.append((a, b, s, v))
        return pd.DataFrame(rows, columns=["sid1", "sid2", "sld", "nsld"])

    return keyed_with_tokens.groupBy("ksid").applyInPandas(
        reduce_group, schema=RESULT_SCHEMA
    )
