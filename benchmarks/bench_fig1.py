"""Benchmark for Fig 1: TSJ end-to-end under the two dedup strategies.

pytest-benchmark times the full pipeline (one round — each run is a
multi-stage Spark job); the figure's machine-scaling table itself is
produced by ``jobs/fig1_dedup_scaling.py``.
"""
import pytest

from repro.experiments import measure_tsj
from repro.namegen import names_corpus

N = 4000
T = 0.1
M = 75


@pytest.fixture(scope="module")
def corpus(spark):
    df = names_corpus(spark, n=N, seed=7)
    df.cache().count()
    return df


@pytest.mark.parametrize("dedup", ["one", "both"])
def test_fig1_tsj_dedup(benchmark, spark, corpus, dedup):
    def run():
        return measure_tsj(
            spark, corpus, t=T, m=M, variant="fuzzy", dedup=dedup
        ).n_pairs

    n_pairs = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n_pairs > 0
