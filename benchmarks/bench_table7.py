"""Benchmark reproducing Table 7: worker-level data-channel counts for the
{J1, J4} reconfiguration of W2 — a pure graph computation expected to match
the paper EXACTLY."""
import pathlib

from repro.experiments import format_table, table7_rows

OUT = pathlib.Path(__file__).parent / "out"


def test_table7_channels(benchmark):
    rows = benchmark(table7_rows)
    text = format_table(rows, "Table 7 — data channels, all workers vs MCS workers")
    OUT.mkdir(exist_ok=True)
    (OUT / "table7.txt").write_text(text)
    print("\n" + text)
    for r in rows:
        assert r["channels_all"] == r["paper_channels_all"]
        assert r["channels_mcs"] == r["paper_channels_mcs"]
