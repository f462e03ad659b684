"""Benchmark for Figs 2/4: TSJ under the three algorithms at the T
extremes of the paper's sweep. The full sweep table comes from
``jobs/fig2_runtime_vs_T.py`` / ``jobs/fig4_pairs_vs_T.py``.
"""
import pytest

from repro.experiments import measure_tsj
from repro.namegen import names_corpus

N = 4000
M = 75


@pytest.fixture(scope="module")
def corpus(spark):
    df = names_corpus(spark, n=N, seed=7)
    df.cache().count()
    return df


@pytest.mark.parametrize("variant", ["fuzzy", "greedy", "exact"])
@pytest.mark.parametrize("t", [0.025, 0.225])
def test_fig2_tsj_variant_vs_t(benchmark, spark, corpus, variant, t):
    def run():
        return measure_tsj(spark, corpus, t=t, m=M, variant=variant).n_pairs

    n_pairs = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n_pairs >= 0
