"""T25 (Fig 25): average answer counts of the query workload."""
from repro.experiments.tables import t25_selectivity

from .util import build_table

WINDOWS = (300, 600, 1200)


def test_t25_selectivity(benchmark):
    df = build_table(
        benchmark,
        t25_selectivity,
        dataset="wikitalk",
        windows=WINDOWS,
        qsizes=(6, 9, 12, 15),
        n_edges=2000,
        n_queries=3,
    )
    # Fig 25 shape: answers increase with window size
    for lo, hi in zip(WINDOWS, WINDOWS[1:]):
        assert (df[hi] >= df[lo]).all()
