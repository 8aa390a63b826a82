"""Benchmark reproducing Table 4: reconfiguration delay of Fries vs the
Epoch scheduler for reconfiguration sets in W2 and W3.

Engine parameters are calibrated from Spark profiles of the same
workflows over ``synth_data.tpcds_lite`` (selectivity defaults in
``repro.workflows.defs``). Results are printed side by side with the
paper's numbers and written to ``benchmarks/out/table4.txt``.
"""
import pathlib

from repro.experiments import format_table, table4_rows

OUT = pathlib.Path(__file__).parent / "out"


def test_table4_delays(benchmark):
    rows = benchmark.pedantic(
        lambda: table4_rows(parallelism=4, rate=8000.0, warmup=12.0, t_max=300.0),
        rounds=1,
        iterations=1,
    )
    text = format_table(rows, "Table 4 — reconfiguration delay in W2/W3 (ms, simulated)")
    OUT.mkdir(exist_ok=True)
    (OUT / "table4.txt").write_text(text)
    print("\n" + text)
    # Shape assertions (DESIGN.md §5).
    for r in rows:
        assert r["fries_ms"] <= r["epoch_ms"], r
        assert r["mcs"].replace("*", "") is not None
    singles = [r for r in rows if r["longest_path"] == 0]
    multis = [r for r in rows if r["longest_path"] >= 2]
    assert max(r["fries_ms"] for r in singles) < min(r["epoch_ms"] for r in rows) / 10
    assert min(r["fries_ms"] for r in multis) > max(r["fries_ms"] for r in singles)
