"""T18 (Fig 18): average space vs query size (shares T16's runs)."""
from repro.experiments.tables import t18_space_vs_qsize

from .util import build_table

QSIZES = (6, 9, 12)


def test_t18_space_vs_qsize(benchmark, spark):
    df = build_table(
        benchmark,
        t18_space_vs_qsize,
        spark,
        dataset="wikitalk",
        window=500,
        qsizes=QSIZES,
        n_edges=1000,
        batch=250,
        order_modes=("full",),
    )
    assert (df["Timing"] <= df["Timing-IND"] + 1e-9).all()
