"""Benchmark for Fig 6: distributed scoring of the name-change study
(NSLD + the three weighted fuzzy measures over 10k old/new pairs) and
the ROC summarisation. Table: ``jobs/fig6_roc.py``."""
import pytest

from repro.experiments import fig6_table


def test_fig6_roc_study(benchmark, spark):
    def run():
        return fig6_table(spark, n=4000, seed=11)

    table = benchmark.pedantic(run, rounds=1, iterations=1)
    # The paper's headline: NSLD dominates the set-based fuzzy measures.
    aucs = dict(zip(table["measure"], table["auc"]))
    assert aucs["nsld"] == max(aucs.values())
