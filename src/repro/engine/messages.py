"""Message types exchanged in the simulated engine.

Data messages and epoch/checkpoint markers travel through FIFO data
channels (markers cannot overtake data — the source of epoch-based
reconfiguration delay). FCMs (Def 4.1) travel on the control plane and are
delivered to a worker with a small fixed latency, never queued behind data.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any


@dataclass
class DataMsg:
    """A data tuple: transaction id (= source tuple id), routing key, and a
    creation timestamp for end-to-end latency accounting. ``version_tag``
    is used only by the FCM multi-version scheduler (§4.1)."""

    txn: int
    key: int
    tuple_id: str
    created: float
    version_tag: int | None = None


@dataclass
class EpochMarker:
    """An epoch marker (§3.1) with a propagation scope.

    ``scope_id`` identifies the synchronization round; ``in_scope_edges``
    and ``out_scope_edges`` are worker-level edges (src_worker, dst_worker)
    on which the marker is aligned / forwarded (the whole DAG for EBR, one
    MCS component for Fries); ``reconfig_workers`` apply the piggybacked
    reconfiguration when aligned."""

    scope_id: str
    in_scope_edges: frozenset[tuple[str, str]]
    out_scope_edges: frozenset[tuple[str, str]]
    reconfig_workers: frozenset[str]


@dataclass
class CheckpointMarker:
    """A checkpoint barrier (§7.3); globally aligned like an EBR marker."""

    ckpt_id: int


@dataclass
class FCM:
    """A fast control message from the controller to one worker."""

    kind: str  # "apply" | "start_markers" | "inject_marker" | "register" | "bump_version"
    payload: Any = None
    extra: dict = field(default_factory=dict)
