"""Candidate string-pair generation (paper §III-C and §III-D).

Both generators return ``(sid1, sid2)`` rows with ``sid1 < sid2`` (the
self-join symmetry optimization, §III-G.1) and *with duplicates* — one
row per witnessing token (pair). De-duplication is its own stage
(§III-G.3, :mod:`repro.tsj.dedup`), exactly as in the paper.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def shared_token_pairs(index: DataFrame) -> DataFrame:
    """Pairs of strings sharing at least one (kept) token: the reducer of
    §III-C — group the inverted index by token, emit all string pairs."""
    a = index.select(F.col("tok"), F.col("sid").alias("sid1"))
    b = index.select(F.col("tok"), F.col("sid").alias("sid2"))
    return (
        a.join(b, "tok")
        .where(F.col("sid1") < F.col("sid2"))
        .select("sid1", "sid2")
    )


def similar_token_pairs(index: DataFrame, token_pairs: DataFrame) -> DataFrame:
    """Pairs of strings owning a pair of similar (but distinct) tokens.

    ``token_pairs`` is the MassJoin output (tok1 < tok2, NLD <= T). Both
    orientations are routed through the inverted index; the canonical
    ``sid1 < sid2`` projection folds the symmetry back."""
    sym = token_pairs.select("tok1", "tok2").union(
        token_pairs.select(F.col("tok2").alias("tok1"), F.col("tok1").alias("tok2"))
    )
    a = index.select(F.col("tok").alias("tok1"), F.col("sid").alias("sida"))
    b = index.select(F.col("tok").alias("tok2"), F.col("sid").alias("sidb"))
    joined = a.join(sym, "tok1").join(b, "tok2")
    return (
        joined.where(F.col("sida") != F.col("sidb"))
        .select(
            F.least("sida", "sidb").alias("sid1"),
            F.greatest("sida", "sidb").alias("sid2"),
        )
    )


def generate_candidates(
    index: DataFrame, token_pairs: DataFrame | None
) -> DataFrame:
    """Full candidate stream. ``token_pairs=None`` selects the
    exact-token-matching approximation (§III-G.4): shared-token only."""
    shared = shared_token_pairs(index)
    if token_pairs is None:
        return shared
    return shared.unionByName(similar_token_pairs(index, token_pairs))
