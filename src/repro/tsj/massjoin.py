"""MassJoin-style distributed NLD self-join of the token space
(paper §III-D).

Map side: every indexed token ``y`` emits its ``U(|y|) + 1`` even
segments keyed by ``(chunk, |y|, segment#)``; every probing token ``x``
emits the substrings that could match those segments for each feasible
indexed length (Lemma 9 length condition), using PassJoin's
multi-match-aware windows. The shuffle joins segments to substrings on
the chunk key; matching tokens become candidate pairs, are
de-duplicated, and verified with a banded LD against the Lemma 8 budget.

Self-join optimization (§III-G.1): only the ``|x| <= |y|`` direction is
generated, and equal-length pairs are canonicalised lexicographically.
"""
from __future__ import annotations

from collections.abc import Iterator

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import (
    DoubleType,
    IntegerType,
    StringType,
    StructField,
    StructType,
)

from repro.core.bounds import ld_upper_bound, max_index_length, segment_count
from repro.core.levenshtein import ld_banded, nld_from_ld
from repro.tsj.passjoin import probe_substrings, segments_of

_CHUNK_SCHEMA = StructType(
    [
        StructField("chunk", StringType()),
        StructField("ly", IntegerType()),
        StructField("seg", IntegerType()),
        StructField("tok", StringType()),
    ]
)

TOKEN_PAIRS_SCHEMA = StructType(
    [
        StructField("tok1", StringType()),
        StructField("tok2", StringType()),
        StructField("ld", IntegerType()),
        StructField("nld", DoubleType()),
    ]
)


def _index_rows(batches: Iterator[pd.DataFrame], t: float) -> Iterator[pd.DataFrame]:
    for pdf in batches:
        out = []
        for tok in pdf["tok"]:
            ly = len(tok)
            tau = segment_count(ly, t) - 1
            # For t < 2/3, tau < ly, so all even segments are non-empty.
            for seg, _start, chunk in segments_of(tok, tau):
                out.append((chunk, ly, seg, tok))
        yield pd.DataFrame(out, columns=["chunk", "ly", "seg", "tok"])


def _probe_rows(batches: Iterator[pd.DataFrame], t: float) -> Iterator[pd.DataFrame]:
    for pdf in batches:
        out = []
        for tok in pdf["tok"]:
            lx = len(tok)
            for ly in range(lx, max_index_length(lx, t) + 1):
                tau = segment_count(ly, t) - 1
                for seg, chunk in probe_substrings(tok, ly, tau):
                    out.append((chunk, ly, seg, tok))
        yield pd.DataFrame(out, columns=["chunk", "ly", "seg", "tok"])


def _verify(batches: Iterator[pd.DataFrame], t: float) -> Iterator[pd.DataFrame]:
    for pdf in batches:
        rows = []
        for t1, t2 in zip(pdf["tok1"], pdf["tok2"]):
            a, b = (t1, t2) if len(t1) <= len(t2) else (t2, t1)
            budget = ld_upper_bound(len(a), len(b), t)
            d = ld_banded(a, b, budget)
            if d is None:
                continue
            v = nld_from_ld(d, len(a), len(b))
            if v <= t + 1e-12:
                rows.append((t1, t2, d, v))
        yield pd.DataFrame(rows, columns=["tok1", "tok2", "ld", "nld"])


def nld_token_selfjoin(tokens: DataFrame, t: float) -> DataFrame:
    """All distinct token pairs with ``NLD <= t``.

    ``tokens`` must have a ``tok`` column of distinct tokens. Returns
    ``(tok1, tok2, ld, nld)`` with ``tok1 < tok2`` lexicographically.
    """
    toks = tokens.select("tok")
    index = toks.mapInPandas(lambda it: _index_rows(it, t), schema=_CHUNK_SCHEMA)
    probe = toks.mapInPandas(lambda it: _probe_rows(it, t), schema=_CHUNK_SCHEMA)
    cand = (
        probe.alias("p")
        .join(
            index.alias("i"),
            on=[
                F.col("p.chunk") == F.col("i.chunk"),
                F.col("p.ly") == F.col("i.ly"),
                F.col("p.seg") == F.col("i.seg"),
            ],
        )
        .where(F.col("p.tok") != F.col("i.tok"))
        .select(
            F.least("p.tok", "i.tok").alias("tok1"),
            F.greatest("p.tok", "i.tok").alias("tok2"),
        )
        .distinct()
    )
    return cand.mapInPandas(lambda it: _verify(it, t), schema=TOKEN_PAIRS_SCHEMA)
