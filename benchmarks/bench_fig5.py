"""Benchmark for Fig 5: discovered-pair counts and recall vs M. Times
one two-point sweep and asserts the paper's shape (pair counts grow
with M; greedy recall stays ~1 across M)."""
import pytest

from repro.experiments import sweep_m
from repro.namegen import names_corpus

N = 2500
T = 0.1


@pytest.fixture(scope="module")
def corpus(spark):
    df = names_corpus(spark, n=N, seed=7)
    df.cache().count()
    return df


def test_fig5_recall_vs_m(benchmark, spark, corpus):
    def run():
        return sweep_m(spark, corpus, t=T, ms=(10, 75))

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    fuzzy = table[table["variant"] == "fuzzy"].set_index("m")["n_pairs"]
    assert fuzzy[75] >= fuzzy[10]  # larger M keeps more pairs
    greedy = table[table["variant"] == "greedy"]["recall"]
    assert (greedy > 0.99).all()
