"""MapReduce cluster simulator — the substrate for the paper's
"runtime vs number of machines" axes (Figs 1 and 7).

The paper ran on 100-1000 physical machines; this reproduction runs on
one host, so machine-scaling is *simulated* from the quantities that
actually govern those curves (and that the paper itself uses to explain
them): the distribution of per-reduce-group work, the per-group worker
instantiation overhead (the stated reason grouping-on-one-string beats
grouping-on-both-strings), and fixed per-stage job overhead (the reason
speedup saturates at 3.8x for 10x machines).

Model: each stage has a multiset of reduce groups with costs ``c_g``
(in abstract work units derived from the paper's own per-stage
complexity formulas). Groups are placed on ``W`` workers by the
MapReduce hash partitioner; a worker's time is
``sum_g (c_g + per_group_overhead)``; the stage's time is the makespan
(max over workers) plus a fixed stage-startup cost; the job's runtime
is the sum over stages. Deterministic (Knuth multiplicative hash).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

_KNUTH = np.uint64(2654435761)


@dataclass
class Stage:
    """One MapReduce stage: per-reduce-group costs in work units."""

    name: str
    group_costs: np.ndarray
    per_group_overhead: float = 0.0
    startup: float = 0.0
    group_keys: np.ndarray | None = None  # optional stable keys for hashing

    def __post_init__(self):
        self.group_costs = np.asarray(self.group_costs, dtype=float)
        if self.group_keys is not None:
            self.group_keys = np.asarray(self.group_keys)
            if len(self.group_keys) != len(self.group_costs):
                raise ValueError("group_keys must align with group_costs")


def _worker_of(keys: np.ndarray, w: int) -> np.ndarray:
    """The MapReduce hash partitioner: group -> worker."""
    k = keys.astype(np.uint64, copy=False)
    return ((k * _KNUTH) >> np.uint64(16)).astype(np.int64) % w


def stage_makespan(stage: Stage, workers: int) -> float:
    """Makespan of one stage on ``workers`` machines."""
    n = len(stage.group_costs)
    if n == 0:
        return stage.startup
    keys = (
        stage.group_keys
        if stage.group_keys is not None
        else np.arange(n, dtype=np.uint64)
    )
    assign = _worker_of(keys, workers)
    loads = np.zeros(workers)
    np.add.at(loads, assign, stage.group_costs + stage.per_group_overhead)
    return stage.startup + float(loads.max())


@dataclass
class ClusterSim:
    """A job = an ordered list of stages; runtime(W) sums makespans."""

    stages: list[Stage] = field(default_factory=list)

    def add_stage(self, name, group_costs, *, per_group_overhead=0.0, startup=0.0,
                  group_keys=None) -> "ClusterSim":
        self.stages.append(
            Stage(name, np.asarray(group_costs, dtype=float),
                  per_group_overhead, startup, group_keys)
        )
        return self

    def runtime(self, workers: int) -> float:
        if workers <= 0:
            raise ValueError("workers must be positive")
        return sum(stage_makespan(s, workers) for s in self.stages)

    def sweep(self, worker_counts) -> dict[int, float]:
        return {w: self.runtime(w) for w in worker_counts}
