"""Small-scale integration tests of the per-figure experiment harnesses
(schema + the paper's qualitative claims at toy scale)."""
import pytest

from repro.experiments import (
    fig1_table,
    fig6_table,
    fig7_table,
    measure_tsj,
    sweep_m,
    sweep_t,
)
from repro.namegen import names_corpus

N = 600
M = 40


@pytest.fixture(scope="module")
def corpus(spark):
    df = names_corpus(spark, n=N, seed=7)
    df.cache().count()
    return df


class TestMeasure:
    def test_returns_runtime_and_pairs(self, spark, corpus):
        m = measure_tsj(spark, corpus, t=0.1, m=M, variant="exact")
        assert m.runtime_s > 0
        assert m.n_pairs > 0


class TestSweeps:
    def test_sweep_t_schema_and_recall(self, spark, corpus):
        tab = sweep_t(spark, corpus, m=M, ts=(0.05, 0.2))
        assert list(tab.columns) == ["t", "variant", "runtime_s", "n_pairs", "recall"]
        assert len(tab) == 6
        fuzzy = tab[tab["variant"] == "fuzzy"]
        assert (fuzzy["recall"] == 1.0).all()
        assert (tab["recall"] <= 1.0 + 1e-9).all()

    def test_sweep_t_pairs_grow_with_t(self, spark, corpus):
        tab = sweep_t(spark, corpus, m=M, ts=(0.05, 0.2), variants=("fuzzy",))
        n = tab.set_index("t")["n_pairs"]
        assert n[0.2] >= n[0.05]

    def test_sweep_m_schema(self, spark, corpus):
        tab = sweep_m(spark, corpus, t=0.1, ms=(5, M), variants=("fuzzy", "exact"))
        assert list(tab.columns) == ["m", "variant", "runtime_s", "n_pairs", "recall"]
        n = tab[tab["variant"] == "fuzzy"].set_index("m")["n_pairs"]
        assert n[M] >= n[5]


class TestFig1:
    def test_table_shape_and_monotonicity(self, spark, corpus):
        tab = fig1_table(spark, corpus, t=0.1, m=M, workers=(10, 1000))
        assert set(tab["dedup"]) == {"one", "both"}
        for d in ("one", "both"):
            sub = tab[tab["dedup"] == d].set_index("workers")
            assert (
                sub.loc[1000, "sim_runtime_units"] <= sub.loc[10, "sim_runtime_units"]
            )

    def test_one_string_fewer_or_equal_units_at_low_workers(self, spark, corpus):
        tab = fig1_table(spark, corpus, t=0.1, m=M, workers=(10,))
        units = tab.set_index("dedup")["sim_runtime_units"]
        # grouping-on-one has strictly fewer reduce groups; at low worker
        # counts (total-work regime) it must not be slower.
        assert units["one"] <= units["both"] * 1.05


class TestFig6:
    def test_nsld_dominates(self, spark):
        tab = fig6_table(spark, n=800, seed=11)
        aucs = dict(zip(tab["measure"], tab["auc"]))
        assert aucs["nsld"] == max(aucs.values())
        assert all(0.5 < a <= 1.0 for a in aucs.values())


class TestFig7:
    def test_hmj_slower_in_simulation(self, spark, corpus):
        tab = fig7_table(spark, corpus, t=0.1, m=M, n_centroids=4,
                         workers=(100, 1000))
        piv = tab.pivot_table(index="workers", columns="algo",
                              values="sim_runtime_units")
        assert (piv["hmj"] > piv["tsj"]).all()

    def test_same_corpus_same_pairs(self, spark, corpus):
        tab = fig7_table(spark, corpus, t=0.1, m=10**9, n_centroids=4,
                         workers=(100,))
        pairs = tab.set_index("algo")["n_pairs"]
        # With M = infinity TSJ-fuzzy is complete, so both must agree.
        assert pairs["tsj"] == pairs["hmj"]
