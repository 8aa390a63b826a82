"""Runtime reconfiguration schedulers on the simulated engine.

Each scheduler issues controller actions for a reconfiguration request at
time ``t`` and defines how the reconfiguration delay is measured:

* :class:`FriesScheduler` — Algorithms 2/3/4 planned on the *worker-level*
  DAG (§7.2): FCMs to each MCS component's head workers, epoch markers
  only inside components.
* :class:`EpochScheduler` — the EBR baseline (Chi): markers injected at
  every source worker, aligned across the whole dataflow, reconfiguration
  piggybacked.
* :class:`SavepointScheduler` — Flink stop-and-restart: EBR alignment to
  the sinks plus a fixed stop/restart overhead.
* :class:`NaiveFCMScheduler` — FCMs straight to the reconfiguration
  workers; low delay but not conflict-serializable (§4.1).
* :class:`MultiVersionScheduler` — the FCM multi-version scheduler (§4.1):
  consistent, but old-version in-flight tuples still processed under the
  old configuration, and double state.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

from repro.core.dag import DAG, Operator
from repro.core.fries import ReconfigPlan, plan_general

from .messages import EpochMarker, FCM
from .simulator import Simulator
from .workload import WorkflowSpec


def effective_logical_dag(spec: WorkflowSpec) -> DAG:
    """The logical DAG with §7.2's broadcast adjustment: an operator with a
    broadcast output edge behaves as if a Replicate operator followed it —
    one-to-many overall, edge-wise one-to-one — so Algorithm 4's pruning
    rules apply unchanged."""
    out = DAG()
    broadcasters = {a for (a, b), e in spec.edges.items() if e.strategy == "broadcast"}
    for v in spec.dag.topological_order():
        o = spec.dag.op(v)
        out.add_operator(
            Operator(
                o.name,
                one_to_many=o.one_to_many or v in broadcasters,
                edgewise_one_to_one=o.edgewise_one_to_one
                or (v in broadcasters and not o.one_to_many),
                unique_per_txn=o.unique_per_txn,
                blocking=o.blocking,
                is_source=o.is_source,
            )
        )
    for e in spec.dag.edges:
        out.add_edge(*e)
    return out


def worker_edges_of(sim: Simulator, logical_edge: tuple[str, str]) -> list[tuple[str, str]]:
    """Worker-level channels implementing one logical edge."""
    a, b = logical_edge
    strat = spec_strategy(sim, logical_edge)
    pa = sim.spec.ops[a].parallelism
    pb = sim.spec.ops[b].parallelism
    if strat == "forward":
        return [(f"{a}#{i}", f"{b}#{i}") for i in range(pa)]
    return [(f"{a}#{i}", f"{b}#{j}") for i in range(pa) for j in range(pb)]


def spec_strategy(sim: Simulator, edge: tuple[str, str]) -> str:
    return sim.spec.edge_spec(edge).strategy


@dataclass
class ReconfigResult:
    """Delay measurement for one reconfiguration request."""

    request_time: float
    apply_times: dict[str, float] = field(default_factory=dict)
    delay: float = math.inf
    completed: bool = False
    plan: ReconfigPlan | None = None


def _measure(sim: Simulator, workers: frozenset[str], t_req: float, plan=None) -> ReconfigResult:
    times = {w: sim.apply_times[w] for w in workers if w in sim.apply_times}
    done = len(times) == len(workers)
    return ReconfigResult(
        request_time=t_req,
        apply_times=times,
        delay=(max(times.values()) - t_req) if done else math.inf,
        completed=done,
        plan=plan,
    )


class FriesScheduler:
    """Fries runtime (§5.3/§6.2/§6.3/§7.2).

    The plan (MCS, components, heads) is computed on the *logical* DAG with
    the broadcast adjustment — the §6.3 pruning rules are defined on
    logical edges (a hash edge's p² channels implement one logical edge) —
    then mapped to the worker level: FCMs go to every worker of each head
    operator, and epoch markers propagate on the worker channels of the
    component's edges, exactly as the paper's Flink implementation (§8.1).
    """

    def __init__(self, *, prune: bool = True) -> None:
        self.prune = prune
        self.plan: ReconfigPlan | None = None
        self._workers: frozenset[str] = frozenset()

    def request(self, sim: Simulator, reconfig_ops: set[str], t: float) -> None:
        workers = sim.reconfig_workers(reconfig_ops)
        self._workers = workers
        plan = plan_general(effective_logical_dag(sim.spec), reconfig_ops, prune=self.prune)
        self.plan = plan
        for idx, comp in enumerate(plan.component_list):
            scope = frozenset(
                we for e in comp.edges for we in worker_edges_of(sim, e)
            )
            marker = EpochMarker(
                scope_id=f"fries-{t}-{idx}",
                in_scope_edges=scope,
                out_scope_edges=scope,
                reconfig_workers=frozenset(
                    w.name
                    for op in (plan.reconfig_ops & comp.vertices)
                    for w in sim.by_op[op]
                ),
            )
            for head_op in plan.heads[idx]:
                for w in sim.by_op[head_op]:
                    sim.send_fcm(
                        w.name, FCM("start_markers", marker), at=t + sim.spec.fcm_latency
                    )

    def result(self, sim: Simulator, t: float) -> ReconfigResult:
        return _measure(sim, self._workers, t, self.plan)


class EpochScheduler:
    """EBR baseline: new epoch at every source, global alignment."""

    def __init__(self) -> None:
        self._workers: frozenset[str] = frozenset()

    def request(self, sim: Simulator, reconfig_ops: set[str], t: float) -> None:
        workers = sim.reconfig_workers(reconfig_ops)
        self._workers = workers
        all_edges = frozenset(sim.pdf.dag.edges)
        marker = EpochMarker(
            scope_id=f"ebr-{t}",
            in_scope_edges=all_edges,
            out_scope_edges=all_edges,
            reconfig_workers=workers,
        )
        for op in sim.spec.dag.sources():
            for w in sim.by_op[op]:
                sim.send_fcm(w.name, FCM("inject_marker", marker), at=t + sim.spec.fcm_latency)

    def result(self, sim: Simulator, t: float) -> ReconfigResult:
        return _measure(sim, self._workers, t)


class SavepointScheduler(EpochScheduler):
    """Flink savepoint + stop-and-restart: EBR delay at the *sinks* (the
    whole old epoch must drain) plus a fixed stop/restart overhead."""

    def __init__(self, stop_restart_cost: float = 10.0) -> None:
        super().__init__()
        self.stop_restart_cost = stop_restart_cost
        self._sink_workers: frozenset[str] = frozenset()

    def request(self, sim: Simulator, reconfig_ops: set[str], t: float) -> None:
        # The savepoint must cover every operator, so the marker also
        # targets the sinks: their apply time marks epoch completion.
        workers = sim.reconfig_workers(reconfig_ops)
        sinks = frozenset(
            w.name for op in sim.spec.dag.sinks() for w in sim.by_op[op]
        )
        self._workers = workers
        self._sink_workers = sinks
        all_edges = frozenset(sim.pdf.dag.edges)
        marker = EpochMarker(
            scope_id=f"svp-{t}",
            in_scope_edges=all_edges,
            out_scope_edges=all_edges,
            reconfig_workers=workers | sinks,
        )
        for op in sim.spec.dag.sources():
            for w in sim.by_op[op]:
                sim.send_fcm(w.name, FCM("inject_marker", marker), at=t + sim.spec.fcm_latency)

    def result(self, sim: Simulator, t: float) -> ReconfigResult:
        r = _measure(sim, self._workers | self._sink_workers, t)
        if r.completed:
            r.delay += self.stop_restart_cost
        return r


class NaiveFCMScheduler:
    """§4.1 naive scheduler: FCM directly to each reconfiguration worker."""

    def __init__(self) -> None:
        self._workers: frozenset[str] = frozenset()

    def request(self, sim: Simulator, reconfig_ops: set[str], t: float) -> None:
        workers = sim.reconfig_workers(reconfig_ops)
        self._workers = workers
        for w in workers:
            sim.send_fcm(w, FCM("apply"), at=t + sim.spec.fcm_latency)

    def result(self, sim: Simulator, t: float) -> ReconfigResult:
        return _measure(sim, self._workers, t)


class MultiVersionScheduler:
    """§4.1 FCM multi-version scheduler.

    All workers get a "register" FCM (they will honour per-tuple version
    tags); after an ack round-trip the sources bump their version and tag
    subsequent tuples v2. The reconfiguration is complete when no
    reconfiguration worker will ever process a v1 tuple again — measured
    post-hoc as the last v1 data operation on a reconfiguration worker.
    """

    def __init__(self) -> None:
        self._workers: frozenset[str] = frozenset()

    def request(self, sim: Simulator, reconfig_ops: set[str], t: float) -> None:
        workers = sim.reconfig_workers(reconfig_ops)
        self._workers = workers
        for w in sim.workers:
            sim.send_fcm(w, FCM("register"), at=t + sim.spec.fcm_latency)
        # Version bump after every registration acked (one more RTT).
        t_bump = t + 3 * sim.spec.fcm_latency
        for op in sim.spec.dag.sources():
            for w in sim.by_op[op]:
                sim.send_fcm(w.name, FCM("bump_version"), at=t_bump)

    def result(self, sim: Simulator, t: float) -> ReconfigResult:
        last_v1: dict[str, float] = {w: t for w in self._workers}
        seen_v2: set[str] = set()
        for when, worker, _txn, version in sim.data_log:
            if worker in last_v1 and when >= t:
                if version <= 1:
                    last_v1[worker] = max(last_v1[worker], when)
                else:
                    seen_v2.add(worker)
        done = seen_v2 >= self._workers
        delay = (max(last_v1.values()) - t) if done else math.inf
        return ReconfigResult(
            request_time=t,
            apply_times=dict(last_v1) if done else {},
            delay=delay,
            completed=done,
        )


def run_reconfig_experiment(
    sim: Simulator,
    scheduler,
    reconfig_ops: set[str],
    *,
    t_request: float,
    t_end: float,
) -> ReconfigResult:
    """Warm the engine up to ``t_request``, issue the reconfiguration, run
    to ``t_end`` (or drain), and return the measured delay."""
    sim.start()
    sim.run(until=t_request)
    scheduler.request(sim, reconfig_ops, t_request)
    sim.run(until=t_end)
    return scheduler.result(sim, t_request)
