"""T23 (Fig 23): throughput vs decomposition size k at |E(Q)| = 12."""
from repro.experiments.tables import t23_throughput_vs_k

from .util import build_table

KS = (1, 3, 6, 12)


def test_t23_throughput_vs_k(benchmark, spark):
    df = build_table(
        benchmark,
        t23_throughput_vs_k,
        spark,
        dataset="wikitalk",
        ks=KS,
        qsize=12,
        window=500,
        n_edges=1000,
        batch=250,
        methods=("Timing", "Timing-IND", "SJ-tree", "IncMat-quicksi"),
    )
    assert set(df["k"]) == set(KS)
    assert (df["Timing"] > 0).all()
