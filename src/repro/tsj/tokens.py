"""Token-space construction (paper §III-C/III-D prologue).

From the corpus of names we derive:

- ``strings``: one row per tokenized string with the metadata TSJ
  attaches to its identifier — aggregate length L, token count, and the
  sorted token-length histogram used by the §III-E.2 filter;
- ``token space``: the distinct tokens with their *document frequency*
  (number of tokenized strings containing the token); the M-filter
  (§III-G.2) drops tokens with df > M from candidate generation.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    ArrayType,
    IntegerType,
    LongType,
    StringType,
    StructField,
    StructType,
)

from repro.core.tokenize import tokenize

STRINGS_SCHEMA = StructType(
    [
        StructField("sid", LongType()),
        StructField("name", StringType()),
        StructField("tokens", ArrayType(StringType())),
        StructField("l", IntegerType()),
        StructField("nt", IntegerType()),
        StructField("tok_lens", ArrayType(IntegerType())),
    ]
)


def build_strings(spark: SparkSession, names: DataFrame) -> DataFrame:
    """Tokenize a ``(sid, name)`` corpus into the strings table.

    Rows tokenizing to the empty multiset are dropped: an empty
    tokenized string has NSLD = 1 to everything non-empty (Lemma 5) and
    identical empty strings are not interesting join output.
    """

    def gen(batches):
        for pdf in batches:
            toks = pdf["name"].map(tokenize)
            keep = toks.map(len) > 0
            pdf = pdf.loc[keep]
            toks = toks[keep]
            yield pd.DataFrame(
                {
                    "sid": pdf["sid"].astype("int64"),
                    "name": pdf["name"],
                    "tokens": toks,
                    "l": toks.map(lambda ts: sum(len(t) for t in ts)).astype("int32"),
                    "nt": toks.map(len).astype("int32"),
                    "tok_lens": toks.map(lambda ts: sorted(len(t) for t in ts)),
                }
            )

    return names.select("sid", "name").mapInPandas(gen, schema=STRINGS_SCHEMA)


def token_space(strings: DataFrame) -> DataFrame:
    """Distinct tokens with document frequency: ``(tok, len, df)``.

    A token occurring twice in one string counts once toward df, which
    is the paper's "shared by more than M tokenized strings" semantics.
    """
    return (
        strings.select("sid", F.explode("tokens").alias("tok"))
        .distinct()
        .groupBy("tok")
        .agg(F.count("*").alias("df"))
        .withColumn("len", F.length("tok").cast("int"))
        .select("tok", "len", "df")
    )


def kept_tokens(tokens: DataFrame, m: int) -> DataFrame:
    """The M-filter: tokens with df <= ``m`` (§III-G.2)."""
    return tokens.where(F.col("df") <= m)


def inverted_index(strings: DataFrame, kept: DataFrame) -> DataFrame:
    """``(tok, sid)`` posting list restricted to kept tokens, one row per
    (token, string) even when a token repeats inside the string."""
    postings = strings.select("sid", F.explode("tokens").alias("tok")).distinct()
    return postings.join(kept.select("tok"), "tok")
