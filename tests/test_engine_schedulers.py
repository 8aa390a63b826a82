"""Scheduler tests on the simulated engine: consistency (conflict-
serializability of recorded schedules) and delay ordering for all five
runtime schedulers."""
import random

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import check
from repro.core.dag import DAG
from repro.engine import (
    EpochScheduler,
    FriesScheduler,
    KeyDist,
    MultiVersionScheduler,
    NaiveFCMScheduler,
    OpSpec,
    SavepointScheduler,
    Simulator,
    WorkflowSpec,
    run_reconfig_experiment,
)


def fig2_spec(fm_cost=0.02) -> WorkflowSpec:
    """The running-example pipeline src → FC → FM → MC → sink with an
    expensive FM (so in-flight tuples exist at reconfiguration time)."""
    dag = DAG.from_edges([("src", "FC"), ("FC", "FM"), ("FM", "MC"), ("MC", "sink")])
    ops = {
        "src": OpSpec("src", kind="source", rate=500, n_tuples=400,
                      key_dist=KeyDist.uniform(100)),
        "FC": OpSpec("FC", kind="map", cost={1: 0.001}),
        "FM": OpSpec("FM", kind="map", cost={1: fm_cost, 2: 0.002}),
        "MC": OpSpec("MC", kind="map", cost={1: 0.001}),
        "sink": OpSpec("sink", kind="sink"),
    }
    return WorkflowSpec(dag=dag, ops=ops)


def fig8_spec() -> WorkflowSpec:
    """One-to-many join J fanning out to FMX via split SP (Figure 8)."""
    dag = DAG.from_edges(
        [("src", "FC"), ("FC", "J"), ("J", "SP"), ("SP", "FMX"), ("SP", "FMY"),
         ("FMX", "U"), ("FMY", "U"), ("U", "sink")],
        one_to_many=["J"],
    )
    ops = {
        "src": OpSpec("src", kind="source", rate=300, n_tuples=200,
                      key_dist=KeyDist.uniform(50)),
        "FC": OpSpec("FC", kind="map", cost={1: 0.0005}),
        "J": OpSpec("J", kind="join", fanout=3, cost={1: 0.0005},
                    out_key=KeyDist.uniform(50)),
        "SP": OpSpec("SP", kind="split", cost={1: 0.0002}),
        "FMX": OpSpec("FMX", kind="map", cost={1: 0.01, 2: 0.001}),
        "FMY": OpSpec("FMY", kind="map", cost={1: 0.01, 2: 0.001}),
        "U": OpSpec("U", kind="union", cost={1: 0.0002}),
        "sink": OpSpec("sink", kind="sink"),
    }
    return WorkflowSpec(dag=dag, ops=ops)


def run(spec, scheduler, ops, *, t_req=0.3, t_end=200.0, watched=None):
    sim = Simulator(spec, record="watched", watched_ops=watched or set(ops))
    res = run_reconfig_experiment(sim, scheduler, set(ops), t_request=t_req, t_end=t_end)
    return sim, res


class TestNaiveScheduler:
    def test_fig2_anomaly(self):
        """The §4.1 motivating example: naive FCMs to FM and MC produce a
        non-conflict-serializable schedule (S3)."""
        sim, res = run(fig2_spec(), NaiveFCMScheduler(), {"FM", "MC"})
        assert res.completed
        assert not check(sim.schedule_log).serializable

    def test_fast_delay(self):
        sim, res = run(fig2_spec(), NaiveFCMScheduler(), {"FM", "MC"})
        assert res.delay < 0.1

    def test_safe_on_split_paths(self):
        """Example 5.3 / Figure 6: reconfiguring C and D on disjoint paths
        is safe even for the naive scheduler."""
        dag = DAG.from_edges([("src", "X"), ("X", "C"), ("X", "D"),
                              ("C", "sink"), ("D", "sink")])
        ops = {
            "src": OpSpec("src", kind="source", rate=500, n_tuples=300,
                          key_dist=KeyDist.uniform(40)),
            "X": OpSpec("X", kind="split", cost={1: 0.002}),
            "C": OpSpec("C", kind="map", cost={1: 0.004}),
            "D": OpSpec("D", kind="map", cost={1: 0.004}),
            "sink": OpSpec("sink", kind="sink"),
        }
        sim, res = run(WorkflowSpec(dag=dag, ops=ops), NaiveFCMScheduler(), {"C", "D"})
        assert res.completed
        assert check(sim.schedule_log).serializable

    def test_fig8_single_op_anomaly(self):
        """§6.1: naive FCM to FMX alone *can* split a fanned-out
        transaction (schedule S5). The anomaly is timing-dependent, so we
        probe several request times and require it to occur at least once —
        while Fries at the same times never produces it (see
        TestFriesScheduler)."""
        violated = 0
        for t_req in (0.3, 0.35, 0.45, 0.5):
            sim, res = run(fig8_spec(), NaiveFCMScheduler(), {"FMX"}, t_req=t_req)
            assert res.completed
            if not check(sim.schedule_log).serializable:
                violated += 1
        assert violated > 0


class TestFriesScheduler:
    def test_fig2_serializable(self):
        sim, res = run(fig2_spec(), FriesScheduler(), {"FM", "MC"})
        assert res.completed
        assert check(sim.schedule_log).serializable

    def test_fig8_serializable_with_alg3(self):
        sim, res = run(fig8_spec(), FriesScheduler(), {"FMX"}, t_req=0.4)
        assert res.completed
        assert check(sim.schedule_log).serializable

    def test_fig8_plan_includes_join(self):
        _, res = run(fig8_spec(), sched := FriesScheduler(), {"FMX"}, t_req=0.4)
        assert set(sched.plan.component_list[0].vertices) == {"J", "SP", "FMX"}

    def test_faster_than_epoch(self):
        _, rf = run(fig2_spec(), FriesScheduler(), {"FM", "MC"})
        _, re_ = run(fig2_spec(), EpochScheduler(), {"FM", "MC"})
        assert rf.completed and re_.completed
        assert rf.delay < re_.delay

    def test_singleton_component_near_fcm_latency(self):
        spec = fig2_spec()
        _, res = run(spec, FriesScheduler(), {"FM"})
        # FCM latency + at most one in-process tuple.
        assert res.delay < spec.fcm_latency + 0.05

    def test_parallel_workers_serializable(self):
        spec = fig2_spec()
        for name in ("FC", "FM", "MC"):
            spec.ops[name].parallelism = 3
        sim, res = run(spec, FriesScheduler(), {"FM", "MC"})
        assert res.completed
        assert check(sim.schedule_log).serializable
        assert len(res.apply_times) == 6  # 3 FM + 3 MC workers


class TestEpochScheduler:
    def test_serializable(self):
        sim, res = run(fig2_spec(), EpochScheduler(), {"FM", "MC"})
        assert res.completed
        assert check(sim.schedule_log).serializable

    def test_fig8_serializable(self):
        sim, res = run(fig8_spec(), EpochScheduler(), {"FMX"}, t_req=0.4)
        assert res.completed
        assert check(sim.schedule_log).serializable

    def test_delay_grows_with_inflight(self):
        _, r1 = run(fig2_spec(fm_cost=0.01), EpochScheduler(), {"FM"})
        _, r2 = run(fig2_spec(fm_cost=0.04), EpochScheduler(), {"FM"})
        assert r2.delay > r1.delay


class TestSavepointScheduler:
    def test_worse_than_epoch(self):
        """§8.1: the savepoint scheduler always has a larger delay than the
        epoch scheduler (alignment to the sinks + stop/restart)."""
        _, r_ep = run(fig2_spec(), EpochScheduler(), {"FM"})
        _, r_sv = run(fig2_spec(), SavepointScheduler(stop_restart_cost=5.0), {"FM"})
        assert r_sv.completed
        assert r_sv.delay > r_ep.delay + 4.9


class TestMultiVersionScheduler:
    def test_serializable(self):
        sim, res = run(fig2_spec(), MultiVersionScheduler(), {"FM", "MC"})
        assert res.completed
        assert check(sim.schedule_log).serializable

    def test_delay_comparable_to_epoch(self):
        """§4.1: in-flight old-version tuples still processed with the old
        configuration — the delay stays epoch-like, not FCM-like."""
        _, r_mv = run(fig2_spec(), MultiVersionScheduler(), {"FM", "MC"})
        _, r_fr = run(fig2_spec(), FriesScheduler(), {"FM", "MC"})
        assert r_mv.delay > 10 * r_fr.delay


def _random_chain_spec(rng: random.Random):
    """A random pipeline with optional fanout operator, random costs."""
    n_mid = rng.randint(2, 4)
    names = [f"op{i}" for i in range(n_mid)]
    edges = [("src", names[0])] + list(zip(names, names[1:])) + [(names[-1], "sink")]
    otm = [names[1]] if rng.random() < 0.5 else []
    dag = DAG.from_edges(edges, one_to_many=otm)
    ops = {
        "src": OpSpec("src", kind="source", rate=rng.choice([200, 500]),
                      n_tuples=150, key_dist=KeyDist.uniform(30)),
        "sink": OpSpec("sink", kind="sink"),
    }
    for nm in names:
        if nm in otm:
            ops[nm] = OpSpec(nm, kind="join", fanout=rng.randint(2, 3),
                             cost={1: rng.choice([0.001, 0.005])},
                             out_key=KeyDist.uniform(30))
        else:
            ops[nm] = OpSpec(nm, kind="map",
                             cost={1: rng.choice([0.001, 0.008])},
                             parallelism=rng.choice([1, 2]))
    return WorkflowSpec(dag=dag, ops=ops, seed=rng.randint(0, 999)), names


@settings(max_examples=15, deadline=None)
@given(seed=st.integers(0, 10_000))
def test_fries_always_serializable_random(seed):
    """Theorems 5.8/6.4 as a property test: random pipelines, random
    reconfiguration sets, random request times — Fries schedules are always
    conflict-serializable."""
    rng = random.Random(seed)
    spec, names = _random_chain_spec(rng)
    k = rng.randint(1, min(2, len(names)))
    ops = set(rng.sample(names, k))
    sim = Simulator(spec, record="watched", watched_ops=ops)
    res = run_reconfig_experiment(
        sim, FriesScheduler(), ops,
        t_request=rng.uniform(0.05, 0.5), t_end=500.0,
    )
    assert res.completed
    assert check(sim.schedule_log).serializable


@settings(max_examples=10, deadline=None)
@given(seed=st.integers(0, 10_000))
def test_epoch_always_serializable_random(seed):
    """Lemma 4.11 as a property test."""
    rng = random.Random(seed)
    spec, names = _random_chain_spec(rng)
    ops = set(rng.sample(names, 1))
    sim = Simulator(spec, record="watched", watched_ops=ops)
    res = run_reconfig_experiment(
        sim, EpochScheduler(), ops,
        t_request=rng.uniform(0.05, 0.5), t_end=500.0,
    )
    assert res.completed
    assert check(sim.schedule_log).serializable
