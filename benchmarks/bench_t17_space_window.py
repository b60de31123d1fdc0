"""T17 (Fig 17): average space vs window size (shares T15's runs)."""
from repro.experiments.tables import t17_space_vs_window

from .util import build_table

WINDOWS = (400, 800, 1200)


def test_t17_space_vs_window(benchmark, spark):
    df = build_table(
        benchmark,
        t17_space_vs_window,
        spark,
        dataset="netflow",
        windows=WINDOWS,
        qsize=6,
        n_edges=1000,
        batch=250,
    )
    # Fig 17 shape: MS-tree storage never exceeds the IND representation.
    assert (df["Timing"] <= df["Timing-IND"] + 1e-9).all()
