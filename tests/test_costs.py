"""Tests for the cost-accounting bridge (simcluster.costs)."""
import numpy as np
import pandas as pd
import pytest

from repro.simcluster.costs import (
    _chunk_emissions,
    _one_string_key,
    hmj_cluster_sim,
    tsj_cluster_sim,
    verify_cost,
)

TOKENS = pd.DataFrame({"tok": ["ana", "anna", "bo"], "len": [3, 4, 2],
                       "df": [10, 4, 2]})
TOKEN_PAIRS = pd.DataFrame({"tok1": ["ana"], "tok2": ["anna"]})
CANDS = pd.DataFrame({"sid1": [0, 0, 1], "sid2": [1, 2, 2], "n": [3, 1, 2]})
META = pd.DataFrame({"sid": [0, 1, 2], "l": [10, 12, 11], "nt": [2, 3, 2]})


class TestVerifyCost:
    def test_fuzzy_uses_cubic_alignment(self):
        assert verify_cost(10, 10, 3, 2, "hungarian") == 100 + 27

    def test_greedy_cheaper_for_many_tokens(self):
        f = verify_cost(10, 10, 6, 6, "hungarian")
        g = verify_cost(10, 10, 6, 6, "greedy")
        assert g < f


class TestChunkEmissions:
    def test_positive(self):
        assert _chunk_emissions(6, 0.1) >= 1.0

    def test_grows_with_threshold(self):
        assert _chunk_emissions(10, 0.3) >= _chunk_emissions(10, 0.05)


class TestOneStringKey:
    def test_key_is_endpoint(self):
        keys = _one_string_key(CANDS)
        for k, (a, b) in zip(keys, zip(CANDS["sid1"], CANDS["sid2"])):
            assert k in (a, b)

    def test_consistent_per_pair(self):
        dup = pd.concat([CANDS, CANDS], ignore_index=True)
        keys = _one_string_key(dup)
        assert (keys[: len(CANDS)] == keys[len(CANDS) :]).all()


class TestTsjClusterSim:
    def test_fuzzy_has_massjoin_stages(self):
        sim = tsj_cluster_sim(TOKENS, TOKEN_PAIRS, CANDS, META,
                              t=0.1, variant="fuzzy", dedup="one")
        names = [s.name for s in sim.stages]
        assert "massjoin" in names and "candgen_similar" in names

    def test_exact_skips_massjoin(self):
        sim = tsj_cluster_sim(TOKENS, None, CANDS, META,
                              t=0.1, variant="exact", dedup="one")
        names = [s.name for s in sim.stages]
        assert "massjoin" not in names and "candgen_similar" not in names

    def test_exact_cheaper_than_fuzzy(self):
        f = tsj_cluster_sim(TOKENS, TOKEN_PAIRS, CANDS, META,
                            t=0.1, variant="fuzzy", dedup="one")
        e = tsj_cluster_sim(TOKENS, None, CANDS, META,
                            t=0.1, variant="exact", dedup="one")
        assert e.runtime(10) < f.runtime(10)

    def test_one_string_has_fewer_groups_than_both(self):
        one = tsj_cluster_sim(TOKENS, None, CANDS, META,
                              t=0.1, variant="exact", dedup="one")
        both = tsj_cluster_sim(TOKENS, None, CANDS, META,
                               t=0.1, variant="exact", dedup="both")
        g_one = len(one.stages[-1].group_costs)
        g_both = len(both.stages[-1].group_costs)
        assert g_one <= g_both
        assert g_both == len(CANDS)

    def test_runtime_decreases_with_workers(self):
        sim = tsj_cluster_sim(TOKENS, TOKEN_PAIRS, CANDS, META,
                              t=0.1, variant="fuzzy", dedup="one")
        assert sim.runtime(1) >= sim.runtime(100)


class TestHmjClusterSim:
    def test_partition_imbalance_dominates(self):
        replicas = pd.DataFrame({"part": [0] * 90 + [1] * 10,
                                 "sid": range(100)})
        sim = hmj_cluster_sim(replicas, n_strings=100, n_centroids=2, avg_l=12)
        # Doubling workers cannot help the one giant partition much.
        assert sim.runtime(100) / sim.runtime(1000) < 2.0
