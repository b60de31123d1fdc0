"""T21 (Fig 21): ablation — Timing vs random decomposition / join order."""
from repro.experiments.tables import t21_optimizations

from .util import build_table


def test_t21_optimizations(benchmark, spark):
    df = build_table(
        benchmark,
        t21_optimizations,
        spark,
        dataset="wikitalk",
        window=500,
        qsizes=(9,),
        n_edges=1000,
        batch=250,
    )
    for col in ("Timing", "Timing-RD", "Timing-RJ", "Timing-RDJ"):
        assert col in df.columns and (df[col] > 0).all()
