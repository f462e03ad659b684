"""The Tokenized-String Joiner pipeline (paper §III): generate -> filter
-> dedup -> verify, end to end on Spark DataFrames.

``variant`` selects the paper's three algorithms (§V-B):

- ``"fuzzy"``  — fuzzy-token-matching: shared + similar token candidate
  generation, exact SLD (Hungarian) verification. The reference result.
- ``"greedy"`` — greedy-token-aligning: same candidates, greedy SLD.
- ``"exact"``  — exact-token-matching: shared-token candidates only
  (skips the MassJoin similar-token stage), exact SLD verification.

``dedup`` selects grouping-on-one-string (``"one"``) or
grouping-on-both-strings (``"both"``) — identical output, different
reduce-group granularity (§III-G.3, Fig. 1).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.tsj.candidates import generate_candidates
from repro.tsj.dedup import dedup_both, with_group_key
from repro.tsj.filters import attach_meta, histogram_filter, length_filter
from repro.tsj.massjoin import nld_token_selfjoin
from repro.tsj.tokens import build_strings, inverted_index, kept_tokens, token_space
from repro.tsj.verify import attach_tokens, verify_grouped, verify_pairs

VARIANTS = ("fuzzy", "greedy", "exact")


@dataclass
class TSJArtifacts:
    """Intermediate DataFrames, kept for stats collection / simulation."""

    strings: DataFrame
    tokens_kept: DataFrame
    token_pairs: DataFrame | None
    candidates_filtered: DataFrame  # (sid1, sid2) with duplicates
    result: DataFrame
    stage_counts: dict[str, int] = field(default_factory=dict)


def _align_of(variant: str) -> str:
    if variant not in VARIANTS:
        raise ValueError(f"variant must be one of {VARIANTS}, got {variant!r}")
    return "greedy" if variant == "greedy" else "hungarian"


def tsj_join(
    spark: SparkSession,
    names: DataFrame,
    *,
    t: float = 0.1,
    m: int = 1000,
    variant: str = "fuzzy",
    dedup: str = "one",
    return_artifacts: bool = False,
) -> DataFrame | TSJArtifacts:
    """NSLD self-join of a ``(sid, name)`` corpus at threshold ``t``.

    Returns the verified pairs ``(sid1, sid2, sld, nsld)`` with
    ``sid1 < sid2`` and ``nsld <= t`` — or, with ``return_artifacts``,
    the intermediates as well. Precision is exactly 1.0 for every
    variant (verification always recomputes the distance); ``greedy``
    and ``exact`` may miss pairs (recall <= 1), ``fuzzy`` is complete.
    """
    align = _align_of(variant)
    if dedup not in ("one", "both"):
        raise ValueError(f"dedup must be 'one' or 'both', got {dedup!r}")

    strings = build_strings(spark, names)
    strings.cache()

    kept = kept_tokens(token_space(strings), m)
    index = inverted_index(strings, kept)

    token_pairs = None
    if variant != "exact":
        token_pairs = nld_token_selfjoin(kept, t)

    cand = generate_candidates(index, token_pairs)
    cand = length_filter(attach_meta(cand, strings), t)
    cand = histogram_filter(cand, t).select("sid1", "sid2")

    if dedup == "both":
        pairs = dedup_both(cand)
        result = verify_pairs(attach_tokens(pairs, strings), t, align)
    else:
        keyed = with_group_key(cand)
        k = strings.select(
            F.col("sid").alias("ksid"),
            F.col("tokens").alias("ktokens"),
            F.col("l").alias("kl"),
        )
        v = strings.select(
            F.col("sid").alias("vsid"),
            F.col("tokens").alias("vtokens"),
            F.col("l").alias("vl"),
        )
        result = verify_grouped(keyed.join(k, "ksid").join(v, "vsid"), t, align)

    if not return_artifacts:
        return result
    return TSJArtifacts(
        strings=strings,
        tokens_kept=kept,
        token_pairs=token_pairs,
        candidates_filtered=cand,
        result=result,
    )
