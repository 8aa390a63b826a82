"""A FIFO data channel between two workers, with latency, finite capacity
and backpressure.

Capacity counts both in-transit and delivered-but-unprocessed messages;
when full, the sending worker blocks (backpressure propagates upstream —
§3.2's reason small buffers do not fix epoch delay). Markers do not count
against capacity (they are tiny control records riding the data FIFO), but
they are strictly FIFO-ordered behind previously sent data.
"""
from __future__ import annotations

from collections import deque
from typing import TYPE_CHECKING

from .messages import DataMsg

if TYPE_CHECKING:  # pragma: no cover
    from .simulator import Simulator
    from .worker import Worker


class Channel:
    """Single-producer single-consumer FIFO link ``src -> dst``."""

    def __init__(
        self,
        sim: "Simulator",
        src_name: str,
        dst_name: str,
        *,
        latency: float = 0.001,
        capacity: int = 100,
    ) -> None:
        self.sim = sim
        self.src_name = src_name
        self.dst_name = dst_name
        self.latency = latency
        self.capacity = capacity
        self.queue: deque = deque()  # delivered, awaiting processing
        self.in_transit = 0
        self.dst: "Worker | None" = None  # wired by the simulator
        self.src: "Worker | None" = None
        self.blocked = False  # alignment block: dst must not consume
        self.head_seq = 0  # delivery sequence of current head (arrival order)
        self._next_seq = 0

    # -- producer side ----------------------------------------------------
    def data_load(self) -> int:
        return self.in_transit + len(self.queue)

    def has_room(self) -> bool:
        return self.data_load() < self.capacity

    def send(self, msg) -> None:
        """Enqueue ``msg`` for delivery after ``latency``. Caller must have
        checked ``has_room`` for data messages (markers always fit)."""
        if isinstance(msg, DataMsg):
            self.in_transit += 1
        self.sim.schedule(self.sim.now + self.latency, self._deliver, msg)

    # -- delivery ----------------------------------------------------------
    def _deliver(self, msg) -> None:
        if isinstance(msg, DataMsg):
            self.in_transit -= 1
        self.queue.append((self.sim.global_seq(), msg))
        if self.dst is not None:
            self.dst.notify()

    # -- consumer side -----------------------------------------------------
    def head(self):
        """(seq, msg) at the head, or None if empty/blocked."""
        if self.blocked or not self.queue:
            return None
        return self.queue[0]

    def pop(self):
        seq, msg = self.queue.popleft()
        if isinstance(msg, DataMsg) and self.src is not None:
            # Space freed: wake a sender blocked on this channel.
            self.sim.schedule(self.sim.now, self.src.on_channel_freed, self)
        return msg
