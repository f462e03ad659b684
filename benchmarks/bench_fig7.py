"""Benchmark for Fig 7: TSJ vs the HMJ metric-space baseline on the same
corpus. The machine-scaling table comes from ``jobs/fig7_tsj_vs_hmj.py``;
here the single-host wall-clocks are benchmarked head to head — the
paper's 12-15x gap shows up directly.
"""
import pytest

from repro.experiments import measure_tsj
from repro.hmj.joiner import hmj_join
from repro.namegen import names_corpus

N = 1000
T = 0.1
M = 75


@pytest.fixture(scope="module")
def corpus(spark):
    df = names_corpus(spark, n=N, seed=7)
    df.cache().count()
    return df


def test_fig7_tsj(benchmark, spark, corpus):
    def run():
        return measure_tsj(spark, corpus, t=T, m=M, variant="fuzzy").n_pairs

    assert benchmark.pedantic(run, rounds=1, iterations=1) > 0


def test_fig7_hmj(benchmark, spark, corpus):
    def run():
        r = hmj_join(spark, corpus, t=T, n_centroids=8)
        return r.count()

    assert benchmark.pedantic(run, rounds=1, iterations=1) > 0
