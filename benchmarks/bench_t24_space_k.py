"""T24 (Fig 24): average space vs decomposition size k (shares T23's runs)."""
from repro.experiments.tables import t24_space_vs_k

from .util import build_table

KS = (1, 3, 6, 12)


def test_t24_space_vs_k(benchmark, spark):
    df = build_table(
        benchmark,
        t24_space_vs_k,
        spark,
        dataset="wikitalk",
        ks=KS,
        qsize=12,
        window=500,
        n_edges=1000,
        batch=250,
        methods=("Timing", "Timing-IND", "SJ-tree", "IncMat-quicksi"),
    )
    assert (df["Timing"] <= df["Timing-IND"] + 1e-9).all()
