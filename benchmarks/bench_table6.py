"""Benchmark reproducing Table 6: effect of §6.3 MCS pruning on the
reconfiguration delay in W5 (Replicate + Self-Join)."""
import pathlib

from repro.experiments import format_table, table6_rows

OUT = pathlib.Path(__file__).parent / "out"


def test_table6_pruning(benchmark):
    rows = benchmark.pedantic(
        lambda: table6_rows(parallelism=4, rate=300.0, warmup=60.0, t_max=2000.0),
        rounds=1,
        iterations=1,
    )
    text = format_table(rows, "Table 6 — effect of MCS pruning in W5 (ms, simulated)")
    OUT.mkdir(exist_ok=True)
    (OUT / "table6.txt").write_text(text)
    print("\n" + text)
    by_ops = {r["reconfig_ops"]: r for r in rows}
    # Shape: pruning collapses the delay where possible by orders of
    # magnitude; where impossible (FD3+FD4) the delays are ~equal.
    for ops in ("FD4", "F3", "E1"):
        assert by_ops[ops]["pruned_ms"] * 50 < by_ops[ops]["unpruned_ms"], ops
    fd34 = by_ops["FD3, FD4"]
    assert abs(fd34["pruned_ms"] - fd34["unpruned_ms"]) < 0.1 * fd34["unpruned_ms"]
    # F4: both small (no slow operator between RE and F4).
    assert by_ops["F4"]["unpruned_ms"] < 1000
