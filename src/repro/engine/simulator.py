"""Deterministic discrete-event simulator assembling workers + channels
from a :class:`repro.engine.workload.WorkflowSpec`.

The simulator also exposes the worker-level DAG G* (via
``repro.core.parallel.expand``) so the Fries planner (Algorithms 2–4) runs
directly on the parallel dataflow, as §7.2 prescribes, and keeps the run's
observable logs: the operation schedule (for conflict-serializability
checking), configuration apply times (reconfiguration delay), sink
latencies and checkpoint snapshots.
"""
from __future__ import annotations

import heapq
from typing import Callable, Iterable

from repro.core.parallel import ParallelDataflow, expand
from repro.core.transactions import Schedule

from .channel import Channel
from .messages import FCM
from .worker import Worker
from .workload import WorkflowSpec


class Simulator:
    """One engine instance executing one workflow spec."""

    def __init__(
        self,
        spec: WorkflowSpec,
        *,
        record: str = "watched",  # "none" | "watched" | "all"
        watched_ops: Iterable[str] = (),
        sink_log: bool = False,
    ) -> None:
        self.spec = spec
        self.now = 0.0
        self._heap: list = []
        self._evseq = 0
        self._gseq = 0
        self._txn = 0
        self.record = record
        self.watched_ops = set(watched_ops)
        self.schedule_log = Schedule()
        self.data_log: list[tuple[float, str, int, int]] = []  # (t, worker, txn, version)
        self.apply_times: dict[str, float] = {}
        self.sink_enabled = sink_log
        self.sink_log: list[tuple[float, float, int]] = []  # (arrival, created, txn)
        self.snapshots: dict[int, dict[str, int]] = {}
        self.cancelled_ckpts: set[int] = set()

        # Worker-level DAG (G*) for planning.
        self.pdf: ParallelDataflow = expand(
            spec.dag, spec.parallelism(), spec.strategies()
        )

        # Instantiate workers.
        self.workers: dict[str, Worker] = {}
        self.by_op: dict[str, list[Worker]] = {}
        for op_name in spec.dag.topological_order():
            op = spec.ops[op_name]
            ws = [Worker(self, op, i) for i in range(op.parallelism)]
            self.by_op[op_name] = ws
            for w in ws:
                self.workers[w.name] = w

        # Wire channels per logical edge.
        self.channels: list[Channel] = []
        for (a, b) in spec.dag.edges:
            es = spec.edge_spec((a, b))
            pa, pb = spec.ops[a].parallelism, spec.ops[b].parallelism
            for i in range(pa):
                src = self.by_op[a][i]
                if es.strategy == "forward":
                    targets = [i]
                else:
                    targets = list(range(pb))
                chans = []
                for j in targets:
                    dst = self.by_op[b][j]
                    ch = Channel(
                        self, src.name, dst.name, latency=es.latency, capacity=es.capacity
                    )
                    ch.src, ch.dst = src, dst
                    dst.inputs.append(ch)
                    chans.append(ch)
                    self.channels.append(ch)
                src.out.append((b, es.strategy, chans))

    # ------------------------------------------------------------------
    # event loop
    # ------------------------------------------------------------------
    def schedule(self, t: float, fn: Callable, *args) -> None:
        self._evseq += 1
        heapq.heappush(self._heap, (t, self._evseq, fn, args))

    def global_seq(self) -> int:
        self._gseq += 1
        return self._gseq

    def next_txn(self) -> int:
        self._txn += 1
        return self._txn

    def run(self, until: float | None = None, max_events: int = 50_000_000) -> None:
        """Run sources + event loop until the heap drains or ``until``."""
        n = 0
        while self._heap:
            t, _, fn, args = self._heap[0]
            if until is not None and t > until:
                self.now = until
                return
            heapq.heappop(self._heap)
            self.now = t
            fn(*args)
            n += 1
            if n >= max_events:
                raise RuntimeError("simulation exceeded max_events")

    def start(self) -> None:
        for w in self.workers.values():
            w.start_source()

    # ------------------------------------------------------------------
    # controller-side helpers
    # ------------------------------------------------------------------
    def send_fcm(self, worker: str, fcm: FCM, at: float | None = None) -> None:
        """Deliver an FCM to ``worker`` over the control plane."""
        t = self.now + self.spec.fcm_latency if at is None else at
        self.schedule(t, self.workers[worker].on_fcm, fcm)

    def reconfig_workers(self, reconfig_ops: Iterable[str]) -> frozenset[str]:
        return self.pdf.map_reconfig(set(reconfig_ops))

    # ------------------------------------------------------------------
    # logging
    # ------------------------------------------------------------------
    def _should_record(self, op_name: str) -> bool:
        if self.record == "all":
            return True
        if self.record == "watched":
            return op_name in self.watched_ops
        return False

    def log_data(self, worker_name: str, msg, version: int) -> None:
        op_name = worker_name.rsplit("#", 1)[0]
        if self._should_record(op_name):
            self.schedule_log.record_data(msg.txn, worker_name, msg.tuple_id)
            self.data_log.append((self.now, worker_name, msg.txn, version))

    def log_update(self, worker_name: str) -> None:
        self.apply_times[worker_name] = self.now
        if self.record != "none":
            self.schedule_log.record_update(worker_name)

    def log_sink(self, msg) -> None:
        if self.sink_enabled:
            self.sink_log.append((self.now, msg.created, msg.txn))

    def log_snapshot(self, ckpt_id: int, worker_name: str, version: int) -> None:
        self.snapshots.setdefault(ckpt_id, {})[worker_name] = version
