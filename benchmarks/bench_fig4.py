"""Benchmark for Fig 4: discovered-pair counts and recall vs T. Times
one two-point sweep and asserts the paper's recall ordering (greedy
stays near 1.0; exact degrades as T grows)."""
import pytest

from repro.experiments import sweep_t
from repro.namegen import names_corpus

N = 2500
M = 75


@pytest.fixture(scope="module")
def corpus(spark):
    df = names_corpus(spark, n=N, seed=7)
    df.cache().count()
    return df


def test_fig4_recall_vs_t(benchmark, spark, corpus):
    def run():
        return sweep_t(spark, corpus, m=M, ts=(0.025, 0.225))

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    r = {(row["t"], row["variant"]): row["recall"] for _, row in table.iterrows()}
    assert r[(0.025, "fuzzy")] == 1.0 and r[(0.225, "fuzzy")] == 1.0
    assert r[(0.225, "greedy")] >= r[(0.225, "exact")]
    assert r[(0.225, "exact")] < 1.0  # exact loses recall at large T
