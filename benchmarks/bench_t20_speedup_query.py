"""T20 (Fig 20): concurrency speedup vs query size (schedule simulation)."""
from repro.experiments.tables import t20_speedup_vs_qsize

from .util import build_table

THREADS = (1, 2, 4, 8, 16)


def test_t20_speedup_vs_qsize(benchmark):
    df = build_table(
        benchmark,
        t20_speedup_vs_qsize,
        dataset="netflow",
        window=800,
        qsizes=(6, 9, 12, 15, 18, 21),
        n_edges=2500,
        threads=THREADS,
    )
    assert (df["Timing-N"] >= df["All-locks-N"] - 1e-9).all()
