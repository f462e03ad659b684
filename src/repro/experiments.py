"""Experiment harnesses — one function per evaluation figure of the
paper (the paper's evaluation has no numbered tables; each figure is
reproduced as a table of rows, see DESIGN.md §5).

Every function returns a pandas DataFrame whose rows mirror what the
paper plots, so the jobs can print them and EXPERIMENTS.md can quote
them next to the paper's numbers.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.sld import nsld
from repro.core.tokenize import tokenize
from repro.fuzzyset.measures import fcosine, fdice, fjaccard, idf_weights
from repro.fuzzyset.roc import auc, roc_curve
from repro.hmj.joiner import hmj_join
from repro.namegen import name_changes_pdf
from repro.simcluster.costs import hmj_cluster_sim, tsj_cluster_sim
from repro.tsj.joiner import tsj_join

PAPER_T_SWEEP = (0.025, 0.075, 0.125, 0.175, 0.225)
PAPER_M_SWEEP_FRACTIONS = (0.1, 0.25, 0.5, 0.75, 1.0)  # of the M default
WORKER_SWEEP = (100, 200, 400, 600, 800, 1000)


@dataclass
class TSJMeasurement:
    runtime_s: float
    n_pairs: int
    artifacts: object  # TSJArtifacts


def measure_tsj(
    spark: SparkSession,
    corpus: DataFrame,
    *,
    t: float,
    m: int,
    variant: str,
    dedup: str = "one",
) -> TSJMeasurement:
    """Run one TSJ configuration end-to-end and wall-clock it."""
    t0 = time.perf_counter()
    art = tsj_join(
        spark, corpus, t=t, m=m, variant=variant, dedup=dedup,
        return_artifacts=True,
    )
    art.result.cache()
    n = art.result.count()
    dt = time.perf_counter() - t0
    return TSJMeasurement(runtime_s=dt, n_pairs=n, artifacts=art)


def sweep_t(
    spark: SparkSession,
    corpus: DataFrame,
    *,
    m: int,
    ts: tuple[float, ...] = PAPER_T_SWEEP,
    variants: tuple[str, ...] = ("fuzzy", "greedy", "exact"),
    repeats: int = 1,
    warmup: bool = True,
) -> pd.DataFrame:
    """Figs 2 and 4: runtime and discovered-pair counts while varying T.

    Recall is relative to fuzzy-token-matching at the same (T, M), as in
    the paper (§V-B.2). ``warmup`` runs one throwaway join first so JVM /
    code-gen warmup does not pollute the first measured cell; ``repeats``
    takes the fastest of N runs per cell (wall-clock noise on a shared
    host)."""
    if warmup:
        measure_tsj(spark, corpus, t=ts[0], m=m, variant=variants[0])
    rows = []
    for t in ts:
        base = None
        for v in variants:
            meas = min(
                (measure_tsj(spark, corpus, t=t, m=m, variant=v)
                 for _ in range(repeats)),
                key=lambda x: x.runtime_s,
            )
            if v == "fuzzy":
                base = meas.n_pairs
            rows.append((t, v, meas.runtime_s, meas.n_pairs))
        for i in range(len(rows) - len(variants), len(rows)):
            t_, v_, rt_, n_ = rows[i]
            rows[i] = (t_, v_, rt_, n_, n_ / base if base else 1.0)
    return pd.DataFrame(rows, columns=["t", "variant", "runtime_s", "n_pairs", "recall"])


def sweep_m(
    spark: SparkSession,
    corpus: DataFrame,
    *,
    t: float,
    ms: tuple[int, ...],
    variants: tuple[str, ...] = ("fuzzy", "greedy", "exact"),
    repeats: int = 1,
    warmup: bool = True,
) -> pd.DataFrame:
    """Figs 3 and 5: runtime and discovered-pair counts while varying M.

    See :func:`sweep_t` for ``warmup`` / ``repeats`` semantics."""
    if warmup:
        measure_tsj(spark, corpus, t=t, m=ms[0], variant=variants[0])
    rows = []
    for m in ms:
        base = None
        for v in variants:
            meas = min(
                (measure_tsj(spark, corpus, t=t, m=m, variant=v)
                 for _ in range(repeats)),
                key=lambda x: x.runtime_s,
            )
            if v == "fuzzy":
                base = meas.n_pairs
            rows.append((m, v, meas.runtime_s, meas.n_pairs))
        for i in range(len(rows) - len(variants), len(rows)):
            m_, v_, rt_, n_ = rows[i]
            rows[i] = (m_, v_, rt_, n_, n_ / base if base else 1.0)
    return pd.DataFrame(rows, columns=["m", "variant", "runtime_s", "n_pairs", "recall"])


def _collect_sim_inputs(meas: TSJMeasurement):
    art = meas.artifacts
    tokens_pdf = art.tokens_kept.toPandas()
    token_pairs_pdf = (
        art.token_pairs.select("tok1", "tok2").toPandas()
        if art.token_pairs is not None
        else None
    )
    cand_counts_pdf = (
        art.candidates_filtered.groupBy("sid1", "sid2")
        .agg(F.count("*").alias("n"))
        .toPandas()
    )
    meta_pdf = art.strings.select("sid", "l", "nt").toPandas()
    return tokens_pdf, token_pairs_pdf, cand_counts_pdf, meta_pdf


def fig1_table(
    spark: SparkSession,
    corpus: DataFrame,
    *,
    t: float,
    m: int,
    workers: tuple[int, ...] = WORKER_SWEEP,
    **sim_kw,
) -> pd.DataFrame:
    """Fig 1: simulated runtime vs machines for the two dedup strategies
    (fuzzy-token-matching), plus the measured single-host wall-clock.
    ``sim_kw`` forwards calibration overrides (group_overhead,
    stage_startup) to :func:`repro.simcluster.costs.tsj_cluster_sim`."""
    rows = []
    for dedup in ("one", "both"):
        meas = measure_tsj(spark, corpus, t=t, m=m, variant="fuzzy", dedup=dedup)
        sim = tsj_cluster_sim(
            *_collect_sim_inputs(meas), t=t, variant="fuzzy", dedup=dedup, **sim_kw
        )
        base = sim.runtime(workers[0])
        for w in workers:
            rt = sim.runtime(w)
            rows.append((w, dedup, rt, base / rt, meas.runtime_s, meas.n_pairs))
    return pd.DataFrame(
        rows,
        columns=["workers", "dedup", "sim_runtime_units", "speedup_vs_min_workers",
                 "local_wallclock_s", "n_pairs"],
    )


_MEASURES = ("nsld", "fjaccard", "fcosine", "fdice")


def fig6_table(
    spark: SparkSession,
    *,
    n: int = 10_000,
    seed: int = 11,
    delta: float = 0.8,
    fprs: tuple[float, ...] = (0.01, 0.05, 0.1, 0.2),
) -> pd.DataFrame:
    """Fig 6: ROC of NSLD vs the weighted set-based fuzzy measures when
    predicting fraud from the old-name/new-name distance.

    Distances are computed distributed (mapInPandas); idf weights come
    from the document frequencies over all old+new names in the study.
    """
    changes = name_changes_pdf(n=n, seed=seed)
    docs = [tokenize(x) for x in pd.concat([changes["old_name"], changes["new_name"]])]
    df_counts: dict[str, int] = {}
    for d in docs:
        for tok in set(d):
            df_counts[tok] = df_counts.get(tok, 0) + 1
    weights = idf_weights(df_counts, len(docs))

    def score(batches):
        for pdf in batches:
            o = pdf["old_name"].map(tokenize)
            nn = pdf["new_name"].map(tokenize)
            yield pd.DataFrame(
                {
                    "is_fraud": pdf["is_fraud"],
                    "nsld": [nsld(a, b) for a, b in zip(o, nn)],
                    "fjaccard": [1 - fjaccard(a, b, weights, delta) for a, b in zip(o, nn)],
                    "fcosine": [1 - fcosine(a, b, weights, delta) for a, b in zip(o, nn)],
                    "fdice": [1 - fdice(a, b, weights, delta) for a, b in zip(o, nn)],
                }
            )

    schema = ("is_fraud boolean, nsld double, fjaccard double, "
              "fcosine double, fdice double")
    scored = (
        spark.createDataFrame(changes)
        .repartition(32)
        .mapInPandas(score, schema=schema)
        .toPandas()
    )
    y = scored["is_fraud"].to_numpy()
    rows = []
    for mname in _MEASURES:
        fpr, tpr = roc_curve(scored[mname].to_numpy(), y)
        row = [mname, auc(fpr, tpr)]
        for target in fprs:
            row.append(float(tpr[np.searchsorted(fpr, target, side="right") - 1]))
        rows.append(row)
    return pd.DataFrame(
        rows, columns=["measure", "auc"] + [f"tpr_at_fpr_{f}" for f in fprs]
    )


def fig7_table(
    spark: SparkSession,
    corpus: DataFrame,
    *,
    t: float,
    m: int,
    n_centroids: int = 8,
    workers: tuple[int, ...] = WORKER_SWEEP,
) -> pd.DataFrame:
    """Fig 7: simulated runtime vs machines, TSJ vs HMJ, same corpus."""
    meas = measure_tsj(spark, corpus, t=t, m=m, variant="fuzzy", dedup="one")
    tsj_sim = tsj_cluster_sim(
        *_collect_sim_inputs(meas), t=t, variant="fuzzy", dedup="one"
    )

    t0 = time.perf_counter()
    result, replicas = hmj_join(
        spark, corpus, t=t, n_centroids=n_centroids, return_replicas=True
    )
    result.cache()
    hmj_pairs = result.count()
    hmj_wall = time.perf_counter() - t0
    replicas_pdf = replicas.select("part", "sid").toPandas()
    n_strings = meas.artifacts.strings.count()
    avg_l = meas.artifacts.strings.agg(F.avg("l")).first()[0]
    hmj_sim = hmj_cluster_sim(
        replicas_pdf, n_strings=n_strings, n_centroids=n_centroids, avg_l=avg_l
    )

    rows = []
    for w in workers:
        rt_t = tsj_sim.runtime(w)
        rt_h = hmj_sim.runtime(w)
        rows.append((w, "tsj", rt_t, 1.0, meas.runtime_s, meas.n_pairs))
        rows.append((w, "hmj", rt_h, rt_h / rt_t, hmj_wall, hmj_pairs))
    return pd.DataFrame(
        rows,
        columns=["workers", "algo", "sim_runtime_units", "slowdown_vs_tsj",
                 "local_wallclock_s", "n_pairs"],
    )
