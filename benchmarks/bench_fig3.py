"""Benchmark for Figs 3/5: TSJ under the three algorithms at the M
extremes of the (scaled) sweep. Full tables: ``jobs/fig3_runtime_vs_M.py``
/ ``jobs/fig5_pairs_vs_M.py``.
"""
import pytest

from repro.experiments import measure_tsj
from repro.namegen import names_corpus

N = 4000
T = 0.1


@pytest.fixture(scope="module")
def corpus(spark):
    df = names_corpus(spark, n=N, seed=7)
    df.cache().count()
    return df


@pytest.mark.parametrize("variant", ["fuzzy", "greedy", "exact"])
@pytest.mark.parametrize("m", [10, 75])
def test_fig3_tsj_variant_vs_m(benchmark, spark, corpus, variant, m):
    def run():
        return measure_tsj(spark, corpus, t=T, m=m, variant=variant).n_pairs

    n_pairs = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n_pairs >= 0
