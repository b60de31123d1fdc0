"""T19 (Fig 19): concurrency speedup vs window size (schedule simulation)."""
from repro.experiments.tables import t19_speedup_vs_window

from .util import build_table

THREADS = (1, 2, 4, 8, 16)


def test_t19_speedup_vs_window(benchmark):
    df = build_table(
        benchmark,
        t19_speedup_vs_window,
        dataset="netflow",
        windows=(400, 800, 1200),
        qsize=9,
        n_edges=2500,
        threads=THREADS,
    )
    # Fig 19 shape: fine-grained locking scales; All-locks stays flat (~1.2).
    assert (df["Timing-N"] >= df["All-locks-N"] - 1e-9).all()
    for w in (400, 800, 1200):
        sub = df[df["window"] == w].sort_values("threads")
        assert sub["Timing-N"].iloc[-1] >= sub["Timing-N"].iloc[0]
