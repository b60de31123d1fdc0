"""T16 (Fig 16): throughput vs query size, all six methods, wikitalk."""
from repro.experiments.tables import t16_throughput_vs_qsize

from .util import build_table

QSIZES = (6, 9, 12)


def test_t16_throughput_vs_qsize(benchmark, spark):
    df = build_table(
        benchmark,
        t16_throughput_vs_qsize,
        spark,
        dataset="wikitalk",
        window=500,
        qsizes=QSIZES,
        n_edges=1000,
        batch=250,
        order_modes=("full",),
    )
    assert set(df["qsize"]) == set(QSIZES)
