"""Tests for the MapReduce cluster simulator (machine-scaling substrate)."""
import numpy as np
import pytest

from repro.simcluster.model import ClusterSim, Stage, stage_makespan


class TestStageMakespan:
    def test_single_worker_sums_everything(self):
        s = Stage("x", np.array([1.0, 2.0, 3.0]))
        assert stage_makespan(s, 1) == pytest.approx(6.0)

    def test_many_workers_bounded_by_biggest_group(self):
        s = Stage("x", np.array([10.0, 1.0, 1.0, 1.0]))
        assert stage_makespan(s, 1000) >= 10.0

    def test_monotone_in_workers(self):
        rng = np.random.default_rng(0)
        s = Stage("x", rng.exponential(1.0, 5000))
        times = [stage_makespan(s, w) for w in (1, 10, 100, 1000)]
        assert times == sorted(times, reverse=True)

    def test_overhead_charged_per_group(self):
        s = Stage("x", np.zeros(100), per_group_overhead=1.0)
        assert stage_makespan(s, 1) == pytest.approx(100.0)

    def test_startup_added(self):
        s = Stage("x", np.array([1.0]), startup=5.0)
        assert stage_makespan(s, 4) == pytest.approx(6.0)

    def test_empty_stage(self):
        assert stage_makespan(Stage("x", np.array([]), startup=2.0), 8) == 2.0

    def test_misaligned_keys_rejected(self):
        with pytest.raises(ValueError):
            Stage("x", np.array([1.0, 2.0]), group_keys=np.array([1]))

    def test_deterministic(self):
        rng = np.random.default_rng(3)
        c = rng.random(1000)
        s = Stage("x", c)
        assert stage_makespan(s, 37) == stage_makespan(Stage("x", c), 37)


class TestClusterSim:
    def test_runtime_sums_stages(self):
        sim = ClusterSim()
        sim.add_stage("a", [4.0]).add_stage("b", [6.0])
        assert sim.runtime(1) == pytest.approx(10.0)

    def test_sweep(self):
        sim = ClusterSim().add_stage("a", np.ones(1000))
        out = sim.sweep([10, 100])
        assert out[10] > out[100]

    def test_rejects_zero_workers(self):
        with pytest.raises(ValueError):
            ClusterSim().add_stage("a", [1.0]).runtime(0)

    def test_sublinear_speedup_with_skew_and_overhead(self):
        # The Fig-1 shape: 10x machines buys well under 10x speedup when
        # groups are skewed and per-group overhead exists.
        rng = np.random.default_rng(7)
        costs = rng.pareto(1.5, 20_000) + 0.1
        sim = ClusterSim().add_stage("verify", costs, per_group_overhead=0.05,
                                     startup=50.0)
        speedup = sim.runtime(100) / sim.runtime(1000)
        assert 1.5 < speedup < 10.0
