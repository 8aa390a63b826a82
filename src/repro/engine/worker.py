"""A simulated operator worker.

Each worker processes one data tuple at a time (cost = seconds per tuple of
its current configuration version), emits derived tuples downstream subject
to channel backpressure, and participates in the control protocols:

* **FCMs** are handled between tuples — immediately if the worker is idle,
  otherwise right after the current tuple finishes and its outputs flush
  (Def 4.1's "applies the new configuration immediately after finishing the
  processing of its current tuple"). Handling an FCM never reorders it
  ahead of this worker's *already sent* data, so marker FIFO holds.
* **Epoch markers** ride the data FIFO. On popping a marker from a channel,
  the worker blocks that channel and waits for markers on every in-scope
  input (epoch alignment, §3.1); on full alignment it applies the
  piggybacked reconfiguration (if targeted), forwards the marker on its
  in-scope output channels, and unblocks.
* **Checkpoint markers** align globally and snapshot the worker's
  configuration version (§7.3).
"""
from __future__ import annotations

import random
from collections import deque
from typing import TYPE_CHECKING

from .channel import Channel
from .messages import CheckpointMarker, DataMsg, EpochMarker, FCM
from .workload import OpSpec

if TYPE_CHECKING:  # pragma: no cover
    from .simulator import Simulator


class Worker:
    """One parallel instance of an operator in the simulated engine."""

    def __init__(self, sim: "Simulator", op: OpSpec, index: int) -> None:
        self.sim = sim
        self.op = op
        self.index = index
        self.name = f"{op.name}#{index}"
        # zlib.crc32 is process-stable (str.__hash__ is salted per process,
        # which would make runs non-reproducible across invocations).
        import zlib

        self.rng = random.Random(
            zlib.crc32(f"{sim.spec.seed}/{op.name}/{index}".encode())
        )
        self.inputs: list[Channel] = []
        # Per logical out-edge: (dst op name, strategy, channels by dst index).
        self.out: list[tuple[str, str, list[Channel]]] = []
        self.version = 1
        self.applied = False
        self.multiversion = False  # registered new config, per-tuple versioning
        self.control: deque[FCM] = deque()
        self.state = "idle"  # idle | busy | blocked
        self._pending: list[tuple[Channel, DataMsg]] = []
        self._dispatch_scheduled = False
        # Epoch-marker alignment: scope_id -> set of channel ids received.
        self._align: dict[str, set[int]] = {}
        self._align_marker: dict[str, EpochMarker] = {}
        self._blocked_channels: dict[str, list[Channel]] = {}
        # Checkpoint alignment.
        self._ckpt_align: dict[int, set[int]] = {}
        self._ckpt_blocked: dict[int, list[Channel]] = {}
        # Self-join per-transaction arrival counts.
        self._sj_state: dict[int, int] = {}
        self.processed = 0
        self._emit_count = 0
        # Source state.
        self._emitted = 0
        self._src_pending: DataMsg | None = None

    # ------------------------------------------------------------------
    # control plane
    # ------------------------------------------------------------------
    def on_fcm(self, fcm: FCM) -> None:
        self.control.append(fcm)
        if self.op.kind == "source":
            self._handle_control()
        else:
            self.notify()

    def _handle_control(self) -> None:
        """Drain the control queue. Only called between tuples (idle, or a
        source between emissions), so configuration swaps never split the
        processing of a tuple and markers stay FIFO behind sent data."""
        while self.control:
            fcm = self.control.popleft()
            if fcm.kind == "apply":
                self._apply_reconfig()
            elif fcm.kind == "start_markers":
                # Fries head: apply if targeted, then open the component's
                # epoch by sending markers on in-component out-channels.
                marker: EpochMarker = fcm.payload
                if self.name in marker.reconfig_workers:
                    self._apply_reconfig()
                self._forward_marker(marker)
            elif fcm.kind == "inject_marker":
                # EBR: a source starts a new epoch carrying the reconfig.
                self._forward_marker(fcm.payload)
            elif fcm.kind == "inject_ckpt":
                self._ckpt_snapshot(fcm.payload)
                self._forward_all(fcm.payload)
            elif fcm.kind == "register":
                self.multiversion = True
            elif fcm.kind == "bump_version":
                self.version = 2
            else:  # pragma: no cover
                raise ValueError(f"unknown FCM {fcm.kind!r}")

    def _apply_reconfig(self) -> None:
        if self.applied:
            return
        self.applied = True
        self.version = 2
        self.sim.log_update(self.name)

    def _forward_marker(self, marker: EpochMarker) -> None:
        for dst_op, _, channels in self.out:
            for ch in channels:
                if (ch.src_name, ch.dst_name) in marker.out_scope_edges:
                    ch.send(marker)

    def _forward_all(self, msg) -> None:
        for _, _, channels in self.out:
            for ch in channels:
                ch.send(msg)

    # ------------------------------------------------------------------
    # data plane
    # ------------------------------------------------------------------
    def notify(self) -> None:
        if self.state == "idle" and not self._dispatch_scheduled:
            self._dispatch_scheduled = True
            self.sim.schedule(self.sim.now, self._dispatch)

    def _dispatch(self) -> None:
        self._dispatch_scheduled = False
        while self.state == "idle":
            if self.control:
                self._handle_control()
                continue
            ch = self._next_channel()
            if ch is None:
                return
            seq_msg = ch.head()
            assert seq_msg is not None
            _, msg = seq_msg
            if isinstance(msg, DataMsg):
                ch.pop()
                self._start_processing(msg)
            elif isinstance(msg, EpochMarker):
                ch.pop()
                self._on_marker(ch, msg)
            elif isinstance(msg, CheckpointMarker):
                ch.pop()
                self._on_ckpt(ch, msg)

    def _next_channel(self) -> Channel | None:
        best, best_seq = None, None
        for ch in self.inputs:
            h = ch.head()
            if h is not None and (best_seq is None or h[0] < best_seq):
                best, best_seq = ch, h[0]
        return best

    def _start_processing(self, msg: DataMsg) -> None:
        version = (
            msg.version_tag
            if (self.multiversion and msg.version_tag is not None)
            else self.version
        )
        self.sim.log_data(self.name, msg, version)
        self.state = "busy"
        cost = self.op.cost_at(version, self.index)
        self.sim.schedule(self.sim.now + cost, self._finish, msg, version)

    def _finish(self, msg: DataMsg, version: int) -> None:
        self.processed += 1
        self._pending = self._emissions(msg)
        self.state = "blocked"
        self._try_emit()

    def _emissions(self, msg: DataMsg) -> list[tuple[Channel, DataMsg]]:
        op, out = self.op, self.out
        kind = op.kind
        targets: list[tuple[int, int]] = []  # (out-edge idx, key)
        if kind in ("map", "union"):
            targets = [(i, msg.key) for i in range(min(1, len(out)))]
        elif kind == "filter":
            if self.rng.random() < op.selectivity:
                targets = [(0, msg.key)] if out else []
        elif kind == "split":
            if out:
                targets = [(msg.key % len(out), msg.key)]
        elif kind == "join":
            if out and self.rng.random() < op.selectivity:
                for _ in range(op.fanout):
                    key = op.out_key.sample(self.rng) if op.out_key else msg.key
                    targets.append((0, key))
        elif kind == "replicate":
            targets = [(i, msg.key) for i in range(len(out))]
        elif kind == "selfjoin":
            n = self._sj_state.get(msg.txn, 0) + 1
            if n >= op.arity:
                self._sj_state.pop(msg.txn, None)
                if out:
                    targets = [(0, msg.key)]
            else:
                self._sj_state[msg.txn] = n
        elif kind == "sink":
            self.sim.log_sink(msg)
            targets = []
        emits: list[tuple[Channel, DataMsg]] = []
        for edge_idx, key in targets:
            dst_op, strategy, channels = out[edge_idx]
            self._emit_count += 1
            child = DataMsg(
                txn=msg.txn,
                key=key,
                tuple_id=f"{msg.tuple_id}/{self.name}.{self._emit_count}",
                created=msg.created,
                version_tag=msg.version_tag,
            )
            if strategy == "broadcast":
                emits.extend((ch, child) for ch in channels)
            elif strategy == "forward":
                emits.append((channels[0], child))
            else:  # hash / rebalance
                emits.append((channels[key % len(channels)], child))
        return emits

    def _try_emit(self) -> None:
        if any(not ch.has_room() for ch, _ in self._pending):
            return  # stay blocked; on_channel_freed retries
        for ch, m in self._pending:
            ch.send(m)
        self._pending = []
        self.state = "idle"
        if self.op.kind == "source":
            self._schedule_next_emit()
        else:
            self.notify()

    def on_channel_freed(self, channel: Channel) -> None:
        if self.state == "blocked" and self._pending:
            self._try_emit()
        elif self.op.kind == "source" and self._src_pending is not None:
            self._source_try_send()

    # ------------------------------------------------------------------
    # epoch markers
    # ------------------------------------------------------------------
    def _expected_marker_channels(self, marker: EpochMarker) -> list[Channel]:
        return [
            ch
            for ch in self.inputs
            if (ch.src_name, ch.dst_name) in marker.in_scope_edges
        ]

    def _on_marker(self, ch: Channel, marker: EpochMarker) -> None:
        sid = marker.scope_id
        self._align.setdefault(sid, set()).add(id(ch))
        self._align_marker[sid] = marker
        ch.blocked = True
        self._blocked_channels.setdefault(sid, []).append(ch)
        expected = self._expected_marker_channels(marker)
        if len(self._align[sid]) >= len(expected):
            self._complete_alignment(sid)

    def _complete_alignment(self, sid: str) -> None:
        marker = self._align_marker.pop(sid)
        self._align.pop(sid, None)
        for ch in self._blocked_channels.pop(sid, []):
            ch.blocked = False
        if self.name in marker.reconfig_workers:
            self._apply_reconfig()
        self._forward_marker(marker)
        self.notify()

    # ------------------------------------------------------------------
    # checkpoint markers
    # ------------------------------------------------------------------
    def _on_ckpt(self, ch: Channel, marker: CheckpointMarker) -> None:
        cid = marker.ckpt_id
        self._ckpt_align.setdefault(cid, set()).add(id(ch))
        ch.blocked = True
        self._ckpt_blocked.setdefault(cid, []).append(ch)
        if len(self._ckpt_align[cid]) >= len(self.inputs):
            self._ckpt_align.pop(cid)
            for c in self._ckpt_blocked.pop(cid, []):
                c.blocked = False
            self._ckpt_snapshot(marker)
            self._forward_all(marker)
            self.notify()

    def _ckpt_snapshot(self, marker: CheckpointMarker) -> None:
        self.sim.log_snapshot(marker.ckpt_id, self.name, self.version)

    # ------------------------------------------------------------------
    # source behaviour
    # ------------------------------------------------------------------
    def start_source(self) -> None:
        if self.op.kind == "source":
            self.sim.schedule(self.sim.now, self._source_emit)

    def _source_emit(self) -> None:
        if self.op.n_tuples is not None and self._emitted >= self.op.n_tuples:
            return
        if self._src_pending is not None:
            return
        txn = self.sim.next_txn()
        key = (
            self.op.key_dist.sample(self.rng)
            if self.op.key_dist
            else self.rng.randrange(1 << 30)
        )
        self._src_pending = DataMsg(
            txn=txn,
            key=key,
            tuple_id=f"t{txn}",
            created=self.sim.now,
            version_tag=self.version if self.multiversion else None,
        )
        self._source_try_send()

    def _source_try_send(self) -> None:
        msg = self._src_pending
        assert msg is not None
        # Tag lazily so a version bump while blocked tags correctly: the
        # tuple enters the stream only now.
        if self.multiversion:
            msg.version_tag = self.version
        emits: list[tuple[Channel, DataMsg]] = []
        for dst_op, strategy, channels in self.out:
            if strategy == "broadcast":
                emits.extend((ch, msg) for ch in channels)
            elif strategy == "forward":
                emits.append((channels[self.index % len(channels)], msg))
            else:
                emits.append((channels[msg.key % len(channels)], msg))
        if any(not ch.has_room() for ch, _ in emits):
            return  # backpressured; resumed by on_channel_freed
        self.sim.log_data(self.name, msg, self.version)
        for ch, m in emits:
            ch.send(m)
        self._src_pending = None
        self._emitted += 1
        self.processed += 1
        self._schedule_next_emit()

    def _schedule_next_emit(self) -> None:
        if self.op.kind != "source":
            return
        if self.op.n_tuples is not None and self._emitted >= self.op.n_tuples:
            return
        rate = self.op.rate_at(self.sim.now)
        self.sim.schedule(self.sim.now + 1.0 / rate, self._source_emit)
