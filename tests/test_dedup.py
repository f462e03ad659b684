"""Tests for the two dedup strategies (§III-G.3): both must produce the
same distinct pair set; the one-string key rule must cover every pair
exactly once."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.tsj.dedup import dedup_both, dedup_one, with_group_key


@pytest.fixture(scope="module")
def cand(spark):
    """A candidate stream with heavy duplication."""
    pdf = pd.DataFrame(
        {
            "sid1": [0, 0, 0, 1, 1, 2, 2, 2, 2, 5],
            "sid2": [1, 1, 2, 3, 3, 7, 7, 7, 9, 6],
        }
    )
    df = spark.createDataFrame(pdf)
    df.cache().count()
    return df


class TestDedupBoth:
    def test_against_oracle(self, spark, cand):
        assert_equivalent(
            dedup_both(cand),
            "SELECT DISTINCT sid1, sid2 FROM cand",
            cand=cand,
        )


class TestDedupOne:
    def test_same_pairs_as_both(self, spark, cand):
        one = set(map(tuple, dedup_one(cand).toPandas().values))
        both = set(map(tuple, dedup_both(cand).toPandas().values))
        assert one == both

    def test_key_is_one_of_the_pair(self, spark, cand):
        keyed = with_group_key(cand).toPandas()
        orig = cand.toPandas()
        for (k, v), (s1, s2) in zip(keyed.values, orig.values):
            assert {k, v} == {s1, s2}

    def test_key_choice_deterministic(self, spark, cand):
        a = with_group_key(cand).toPandas()
        b = with_group_key(cand).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_key_choice_consistent_per_pair(self, spark, cand):
        # The same unordered pair must always map to the same key, or the
        # per-key hash-set dedup would leak duplicates across groups.
        keyed = with_group_key(cand).toPandas()
        seen = {}
        for k, v in keyed.values:
            pair = (min(k, v), max(k, v))
            assert seen.setdefault(pair, k) == k

    def test_balancing_uses_both_sides(self, spark):
        # Over many pairs the hash rule should pick the smaller sid
        # sometimes and the larger sid sometimes (load balancing §III-G.3).
        pdf = pd.DataFrame({"sid1": range(0, 400, 2), "sid2": range(1, 400, 2)})
        keyed = with_group_key(spark.createDataFrame(pdf)).toPandas()
        first_chosen = (keyed["ksid"] % 2 == 0).sum()
        assert 0 < first_chosen < len(keyed)
