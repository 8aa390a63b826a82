"""§8.1 workflows W1–W5 as engine specs (logical DAG + runtime behaviour).

Topologies follow Figure 12 and the Table 4–7 MCS columns; W2's pipelined
edge structure (4 shuffle edges + 1 chained edge) is pinned down exactly by
Table 7's channel counts. Costs, rates and selectivities are scaled to a
single 16-core machine (the paper used 40 workers/operator on a 10-node
cluster); selectivities default to values profiled from the Spark
implementations of the same workflows (``repro.workflows.profiles``).

Every builder takes scale knobs so unit tests run tiny configurations and
benchmarks run the calibrated ones.
"""
from __future__ import annotations

from repro.core.dag import DAG
from repro.engine.workload import EdgeSpec, KeyDist, OpSpec, WorkflowSpec

# Per-tuple costs (seconds). The paper's LSTM-AE inference takes ~25 ms;
# joins/filters are orders of magnitude cheaper.
COST_LSTM = 0.025
COST_LSTM_LIGHT = 0.005
COST_TREE = 0.0005
COST_JOIN = 0.001
COST_CHEAP = 0.0001


def w1(
    *,
    parallelism: int = 4,
    rate: float = 1000.0,
    n_tuples: int | None = None,
    capacity: int = 500,
    n_users: int = 2000,
    rate_schedule: list[tuple[float, float]] | None = None,
) -> WorkflowSpec:
    """W1 — fraud detection: src → FD (user-based LSTM-AE) → sink.

    Reconfigurations swap FD's model: v1 heavy LSTM-AE, v2 light LSTM-AE
    (the §8.3 hot-swaps)."""
    dag = DAG.from_edges([("src", "FD"), ("FD", "sink")])
    ops = {
        "src": OpSpec(
            "src",
            kind="source",
            rate=rate,
            rate_schedule=rate_schedule,
            n_tuples=n_tuples,
            key_dist=KeyDist.zipf(n_users, alpha=1.1),
        ),
        "FD": OpSpec(
            "FD", kind="map", parallelism=parallelism,
            cost={1: COST_LSTM, 2: COST_LSTM_LIGHT, 3: COST_TREE},
        ),
        "sink": OpSpec("sink", kind="sink"),
    }
    edges = {
        ("src", "FD"): EdgeSpec("hash", capacity=capacity),
        ("FD", "sink"): EdgeSpec("hash", capacity=capacity),
    }
    return WorkflowSpec(dag=dag, ops=ops, edges=edges)


# Default per-join selectivities for W2/W3, measured by running the Spark
# implementations over tpcds_lite (repro.workflows.profiles.profile_w2/w3;
# see EXPERIMENTS.md). Order: J1..J4 resp. J5..J9 filters.
W2_SELECTIVITY = {"J1": 1.0, "J2": 1.0, "J3": 0.23, "J4": 0.21}
W3_SELECTIVITY = {"J5": 0.10, "J6": 0.10, "J7": 0.10, "J8": 0.54, "J9": 0.25}


def w2(
    *,
    parallelism: int = 4,
    rate: float = 8000.0,
    n_tuples: int | None = None,
    capacity: int = 500,
    src_capacity: int = 1500,
    cost: float = COST_JOIN,
    n_keys: int = 2000,
    selectivity: dict[str, float] | None = None,
) -> WorkflowSpec:
    """W2 — TPC-DS q40 probe chain: src → J1 → J2 → J3 → J4 → sink.

    Four shuffle edges + one chained edge (pinned by Table 7). All joins
    are one-to-one (PK–FK). Each join repartitions on a new, skewed key.
    ``rate`` is the *total* ingestion rate (tuples/s across all source
    workers); ``src_capacity`` models the source's deep read-ahead buffers
    (the HDFS scan in the paper), which hold most in-flight data."""
    sel = selectivity or W2_SELECTIVITY
    dag = DAG.from_edges(
        [("src", "J1"), ("J1", "J2"), ("J2", "J3"), ("J3", "J4"), ("J4", "sink")]
    )
    ops: dict[str, OpSpec] = {
        "src": OpSpec(
            "src", kind="source", parallelism=parallelism, rate=rate / parallelism,
            n_tuples=n_tuples, key_dist=KeyDist.zipf(n_keys, alpha=1.05),
        ),
        "sink": OpSpec("sink", kind="sink", parallelism=parallelism),
    }
    for j in ("J1", "J2", "J3", "J4"):
        ops[j] = OpSpec(
            j, kind="join", parallelism=parallelism, cost={1: cost},
            selectivity=sel[j], fanout=1, out_key=KeyDist.zipf(n_keys, alpha=1.05),
        )
    edges = {
        ("src", "J1"): EdgeSpec("hash", capacity=src_capacity),
        ("J1", "J2"): EdgeSpec("hash", capacity=capacity),
        ("J2", "J3"): EdgeSpec("hash", capacity=capacity),
        ("J3", "J4"): EdgeSpec("hash", capacity=capacity),
        ("J4", "sink"): EdgeSpec("forward", capacity=capacity),
    }
    return WorkflowSpec(dag=dag, ops=ops, edges=edges)


W3_COSTS = {"J5": 0.002, "J6": 0.002, "J7": 0.002, "J8": 0.006, "J9": 0.002}


def w3(
    *,
    parallelism: int = 4,
    rate: float = 6000.0,
    n_tuples: int | None = None,
    capacity: int = 500,
    src_capacity: int = 800,
    costs: dict[str, float] | None = None,
    n_keys: int = 2000,
    selectivity: dict[str, float] | None = None,
) -> WorkflowSpec:
    """W3 — TPC-DS q71: three channel joins (web/catalog/store × date_dim)
    → union → J8 (× item) → J9 (× time_dim) → sink. ``rate`` is the total
    store-sales rate; web/catalog run at 0.5×/0.75× of it (the TPC-DS
    channel size ordering). All three scan rates exceed the channel joins'
    capacity, so every source edge carries a standing backlog — the paper's
    sources scan HDFS at full speed. J8 (× item, the largest dimension) is
    the costliest join, keeping a moderate backlog on U1→J8 as the paper's
    choke-point analysis describes (§8.2)."""
    sel = selectivity or W3_SELECTIVITY
    cost_of = costs or W3_COSTS
    dag = DAG.from_edges(
        [
            ("src_ws", "J5"),
            ("src_cs", "J6"),
            ("src_ss", "J7"),
            ("J5", "U1"),
            ("J6", "U1"),
            ("J7", "U1"),
            ("U1", "J8"),
            ("J8", "J9"),
            ("J9", "sink"),
        ]
    )
    ops: dict[str, OpSpec] = {
        "U1": OpSpec("U1", kind="union", parallelism=parallelism, cost={1: COST_CHEAP}),
        "sink": OpSpec("sink", kind="sink", parallelism=parallelism),
    }
    for s, r in (("src_ws", 0.5), ("src_cs", 0.75), ("src_ss", 1.0)):
        # Store sales is the biggest channel (TPC-DS 288M vs 144M vs 71M).
        ops[s] = OpSpec(
            s, kind="source", parallelism=parallelism,
            rate=rate * r / parallelism,
            n_tuples=n_tuples, key_dist=KeyDist.zipf(n_keys, alpha=1.05),
        )
    for j in ("J5", "J6", "J7", "J8", "J9"):
        ops[j] = OpSpec(
            j, kind="join", parallelism=parallelism, cost={1: cost_of[j]},
            selectivity=sel[j], fanout=1, out_key=KeyDist.zipf(n_keys, alpha=1.05),
        )
    edges: dict[tuple[str, str], EdgeSpec] = {
        e: EdgeSpec("hash", capacity=capacity) for e in dag.edges
    }
    for s, j in (("src_ws", "J5"), ("src_cs", "J6"), ("src_ss", "J7")):
        edges[(s, j)] = EdgeSpec("hash", capacity=src_capacity)
    edges[("J9", "sink")] = EdgeSpec("forward", capacity=capacity)
    return WorkflowSpec(dag=dag, ops=ops, edges=edges)


def w4(
    *,
    parallelism: int = 4,
    rate: float = 40.0,
    n_tuples: int | None = None,
    capacity: int = 600,
    fd_capacity: int = 4000,
    fanout: int = 12,
    n_users: int = 2000,
    fd_cost: float = COST_LSTM,
    fd2_cost: float = 0.035,
) -> WorkflowSpec:
    """W4 — W1 plus a one-to-many unnest: src(users) → F1 (filter big
    payers) → U2 (unnest payments, one-to-many) → FD1 (user model) → FD2
    (merchant model, 50-recent state → heavier) → F2 (flag) → sink.
    Table 5's reconfigurations. The inference operators' input channels
    (``fd_capacity``) are deep — that is where the standing backlog lives,
    as in the paper's choke-point analysis (§8.2)."""
    dag = DAG.from_edges(
        [
            ("src", "F1"),
            ("F1", "U2"),
            ("U2", "FD1"),
            ("FD1", "FD2"),
            ("FD2", "F2"),
            ("F2", "sink"),
        ],
        one_to_many=["U2"],
    )
    ops = {
        "src": OpSpec(
            "src", kind="source", rate=rate, n_tuples=n_tuples,
            key_dist=KeyDist.zipf(n_users, alpha=1.1),
        ),
        "F1": OpSpec("F1", kind="filter", parallelism=parallelism,
                     cost={1: COST_CHEAP}, selectivity=0.6),
        "U2": OpSpec("U2", kind="join", parallelism=parallelism,
                     cost={1: COST_CHEAP}, fanout=fanout,
                     out_key=KeyDist.zipf(n_users, alpha=1.1)),
        "FD1": OpSpec("FD1", kind="map", parallelism=parallelism,
                      cost={1: fd_cost, 2: COST_LSTM_LIGHT}),
        "FD2": OpSpec("FD2", kind="map", parallelism=parallelism,
                      cost={1: fd2_cost, 2: COST_LSTM_LIGHT}),
        "F2": OpSpec("F2", kind="map", parallelism=parallelism, cost={1: COST_CHEAP}),
        "sink": OpSpec("sink", kind="sink"),
    }
    edges: dict[tuple[str, str], EdgeSpec] = {
        e: EdgeSpec("hash", capacity=capacity) for e in dag.edges
    }
    edges[("U2", "FD1")] = EdgeSpec("hash", capacity=fd_capacity)
    edges[("FD1", "FD2")] = EdgeSpec("hash", capacity=fd_capacity)
    return WorkflowSpec(dag=dag, ops=ops, edges=edges)


def w5(
    *,
    parallelism: int = 4,
    rate: float = 300.0,
    n_tuples: int | None = None,
    capacity: int = 300,
    fd_capacity: int = 20000,
    n_users: int = 2000,
    fd_cost: float = COST_LSTM,
) -> WorkflowSpec:
    """W5 — replicate + self-join: src → RE (replicate) → {FD3 → S1 → F3,
    F4 → FD4} → SJ (self-join on key, unique per txn) → E1 → sink.
    Table 6's pruning experiments. The slow inference operators' input
    channels are deep (``fd_capacity``) so the standing backlog parks there
    and the cheap RE→F4 / RE→FD3 hops stay shallow, as in the paper's
    per-edge choke-point numbers (Figure 12)."""
    dag = DAG.from_edges(
        [
            ("src", "RE"),
            ("RE", "FD3"),
            ("RE", "F4"),
            ("FD3", "S1"),
            ("S1", "F3"),
            ("F3", "SJ"),
            ("F4", "FD4"),
            ("FD4", "SJ"),
            ("SJ", "E1"),
            ("E1", "sink"),
        ],
        edgewise_one_to_one=["RE"],
        unique_per_txn=["SJ"],
    )
    ops = {
        "src": OpSpec(
            "src", kind="source", rate=rate, n_tuples=n_tuples,
            key_dist=KeyDist.zipf(n_users, alpha=1.1),
        ),
        "RE": OpSpec("RE", kind="replicate", parallelism=parallelism, cost={1: COST_CHEAP}),
        "FD3": OpSpec("FD3", kind="map", parallelism=parallelism,
                      cost={1: fd_cost, 2: COST_LSTM_LIGHT}),
        "S1": OpSpec("S1", kind="map", parallelism=parallelism, cost={1: COST_CHEAP}),
        "F3": OpSpec("F3", kind="map", parallelism=parallelism, cost={1: COST_CHEAP}),
        "F4": OpSpec("F4", kind="map", parallelism=parallelism, cost={1: COST_CHEAP}),
        # Worker 0 of FD4 is a straggler (the paper observed an FD3-branch
        # straggler creating the 877s choke point in §8.2; we place ours on
        # FD4 so the FD4 row exceeds the F3 row as in Table 6).
        "FD4": OpSpec("FD4", kind="map", parallelism=parallelism,
                      cost={1: fd_cost, 2: COST_LSTM_LIGHT}, straggler={0: 1.3}),
        "SJ": OpSpec("SJ", kind="selfjoin", parallelism=parallelism,
                     cost={1: COST_CHEAP}, arity=2),
        "E1": OpSpec("E1", kind="map", parallelism=parallelism, cost={1: COST_CHEAP}),
        "sink": OpSpec("sink", kind="sink"),
    }
    edges: dict[tuple[str, str], EdgeSpec] = {
        e: EdgeSpec("hash", capacity=capacity) for e in dag.edges
    }
    edges[("RE", "FD3")] = EdgeSpec("hash", capacity=fd_capacity)
    edges[("F4", "FD4")] = EdgeSpec("hash", capacity=fd_capacity)
    return WorkflowSpec(dag=dag, ops=ops, edges=edges)
