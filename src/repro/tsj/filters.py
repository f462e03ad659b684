"""Candidate-pair filters (paper §III-E).

Both filters run on the id + metadata representation (aggregate length,
token-length histogram) — the strings themselves are only resolved for
the surviving pairs, as in the paper.
"""
from __future__ import annotations

from collections.abc import Iterator

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import ArrayType, IntegerType, LongType, StructField, StructType

from repro.core.bounds import nsld_lower_bound

META_PAIR_SCHEMA = StructType(
    [
        StructField("sid1", LongType()),
        StructField("sid2", LongType()),
        StructField("tok_lens1", ArrayType(IntegerType())),
        StructField("tok_lens2", ArrayType(IntegerType())),
    ]
)


def attach_meta(cand: DataFrame, strings: DataFrame) -> DataFrame:
    """Join the per-string metadata (l, tok_lens) onto both sides of the
    candidate pairs."""
    m1 = strings.select(
        F.col("sid").alias("sid1"),
        F.col("l").alias("l1"),
        F.col("tok_lens").alias("tok_lens1"),
    )
    m2 = strings.select(
        F.col("sid").alias("sid2"),
        F.col("l").alias("l2"),
        F.col("tok_lens").alias("tok_lens2"),
    )
    return cand.join(m1, "sid1").join(m2, "sid2")


def length_filter(cand_meta: DataFrame, t: float) -> DataFrame:
    """Lemma 6 pruning (§III-E.1): keep pairs with
    ``min(L) >= (1 - T) * max(L)`` — expressed in Catalyst so it runs
    map-side on the id + length representation."""
    return cand_meta.where(
        F.least("l1", "l2").cast("double")
        >= (1.0 - t) * F.greatest("l1", "l2").cast("double")
    )


def histogram_filter(cand_meta: DataFrame, t: float) -> DataFrame:
    """Distance-lower-bound pruning (§III-E.2) via the token-length
    histograms: drop a pair when the admissible NSLD lower bound
    (DESIGN.md §4.5) already exceeds T."""

    def gen(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if len(pdf) == 0:
                yield pdf
                continue
            keep = [
                nsld_lower_bound(h1, h2) <= t + 1e-12
                for h1, h2 in zip(pdf["tok_lens1"], pdf["tok_lens2"])
            ]
            yield pdf.loc[keep]

    cols = ["sid1", "sid2", "tok_lens1", "tok_lens2"]
    return cand_meta.select(*cols).mapInPandas(gen, schema=META_PAIR_SCHEMA)
