"""Per-figure experiment definitions (DESIGN.md §5): T15…T25.

Each function returns a tidy pandas DataFrame of the rows the paper's
figure plots, and writes a markdown copy under ``results/``. Sweeps that
share runs (throughput/space come from the same execution) are memoised
per process so T15/T17 (and T16/T18, T23/T24) pay for one sweep.

Scale-down note: window sizes and stream lengths are the DESIGN.md §6
SF-scaled equivalents of the paper's 10K–50K windows over 100M+ edge
streams; EXPERIMENTS.md maps each to the paper's setting.
"""
from __future__ import annotations

import os
from pathlib import Path

import pandas as pd

from ..concurrency.simulate import speedup_curve
from ..concurrency.transactions import trace_transactions
from ..core.pyengine import PyTimingEngine, edges_from_pandas
from ..datagen.queries import generate_query, generate_query_with_k
from ..datagen.streams import DATASETS
from .harness import ABLATIONS, METHODS, make_engine, run_stream

RESULTS_DIR = Path(os.environ.get("REPRO_RESULTS_DIR", "/root/repo/results"))
_CACHE: dict = {}


def to_markdown(df: pd.DataFrame) -> str:
    """Plain-dependency markdown table (the container lacks ``tabulate``)."""
    cols = [str(c) for c in df.columns]
    widths = [
        max(len(c), *(len(str(v)) for v in df[col])) if len(df) else len(c)
        for c, col in zip(cols, df.columns)
    ]
    def row(vals):
        return "| " + " | ".join(str(v).ljust(w) for v, w in zip(vals, widths)) + " |"
    lines = [row(cols), "|" + "|".join("-" * (w + 2) for w in widths) + "|"]
    for _, r in df.iterrows():
        lines.append(row([r[c] for c in df.columns]))
    return "\n".join(lines)


def write_table(name: str, df: pd.DataFrame) -> pd.DataFrame:
    RESULTS_DIR.mkdir(parents=True, exist_ok=True)
    out = RESULTS_DIR / f"{name}.md"
    out.write_text(f"# {name}\n\n{to_markdown(df)}\n")
    return df


def _queries(stream, sizes, order_modes, seed0=0):
    """§VII-B's per-structure order mix (the paper uses {full, ∅, 3 random};
    sweeps here default to {full, random} per size to bound runtime)."""
    out = []
    for size in sizes:
        for i, mode in enumerate(order_modes):
            out.append(
                (size, generate_query(stream, size, order_mode=mode,
                                      seed=seed0 + 31 * size + i))
            )
    return out


# --------------------------------------------------------------------- #
# T15/T17 (vs window) and T16/T18 (vs query size): one shared sweep each
# --------------------------------------------------------------------- #
def sweep(
    spark,
    *,
    dataset: str,
    windows: tuple[int, ...],
    qsizes: tuple[int, ...],
    methods: tuple[str, ...] = tuple(METHODS),
    n_edges: int = 2000,
    batch: int = 250,
    order_modes: tuple[str, ...] = ("full", "random"),
    seed: int = 0,
) -> pd.DataFrame:
    """Throughput + space for methods × windows × query sizes.

    Per (size) cell the paper's order mix is applied and cells report the
    average over it (its figures average 50 queries per point)."""
    key = ("sweep", dataset, windows, qsizes, methods, n_edges, batch,
           order_modes, seed)
    if key in _CACHE:
        return _CACHE[key]
    stream = DATASETS[dataset](n_edges, seed=seed)
    queries = _queries(stream, qsizes, order_modes, seed0=seed)
    rows = []
    for window in windows:
        for qsize, gq in queries:
            for method in methods:
                eng = make_engine(method, spark, gq.query, window, stream=stream)
                m = run_stream(eng, stream, batch)
                rows.append(
                    {
                        "dataset": dataset,
                        "window": window,
                        "qsize": qsize,
                        "order": gq.order_mode,
                        "method": method,
                        "throughput": round(m.throughput_norm, 2),
                        "wall_eps": round(m.throughput, 1),
                        "work": m.work,
                        "avg_space": round(m.avg_space, 1),
                        "matches": m.n_matches,
                        "elapsed_s": round(m.elapsed_s, 2),
                    }
                )
    df = pd.DataFrame(rows)
    _CACHE[key] = df
    return df


def t15_throughput_vs_window(spark, **kw) -> pd.DataFrame:
    df = sweep(spark, dataset=kw.pop("dataset", "netflow"),
               windows=kw.pop("windows", (500, 1000, 1500)),
               qsizes=(kw.pop("qsize", 6),), **kw)
    out = df.pivot_table(index="window", columns="method",
                         values="throughput").reset_index()
    return write_table("T15_throughput_vs_window", out)


def t17_space_vs_window(spark, **kw) -> pd.DataFrame:
    df = sweep(spark, dataset=kw.pop("dataset", "netflow"),
               windows=kw.pop("windows", (500, 1000, 1500)),
               qsizes=(kw.pop("qsize", 6),), **kw)
    out = df.pivot_table(index="window", columns="method",
                         values="avg_space").reset_index()
    return write_table("T17_space_vs_window", out)


def t16_throughput_vs_qsize(spark, **kw) -> pd.DataFrame:
    df = sweep(spark, dataset=kw.pop("dataset", "wikitalk"),
               windows=(kw.pop("window", 800),),
               qsizes=kw.pop("qsizes", (6, 9, 12)), **kw)
    out = df.pivot_table(index="qsize", columns="method",
                         values="throughput").reset_index()
    return write_table("T16_throughput_vs_qsize", out)


def t18_space_vs_qsize(spark, **kw) -> pd.DataFrame:
    df = sweep(spark, dataset=kw.pop("dataset", "wikitalk"),
               windows=(kw.pop("window", 800),),
               qsizes=kw.pop("qsizes", (6, 9, 12)), **kw)
    out = df.pivot_table(index="qsize", columns="method",
                         values="avg_space").reset_index()
    return write_table("T18_space_vs_qsize", out)


# --------------------------------------------------------------------- #
# T19/T20: concurrency speedup (lock-schedule simulation over real traces)
# --------------------------------------------------------------------- #
def t19_speedup_vs_window(
    *,
    dataset: str = "netflow",
    windows: tuple[int, ...] = (500, 1000, 1500),
    qsize: int = 9,
    n_edges: int = 3000,
    threads: tuple[int, ...] = (1, 2, 4, 8, 16),
    seed: int = 0,
) -> pd.DataFrame:
    stream = DATASETS[dataset](n_edges, seed=seed)
    gq = generate_query(stream, qsize, order_mode="random", seed=seed)
    edges = edges_from_pandas(stream)
    rows = []
    for window in windows:
        traces = trace_transactions(gq.query, window, edges)
        curves = speedup_curve(traces, list(threads))
        for n in threads:
            rows.append({"window": window, "threads": n,
                         "Timing-N": round(curves["Timing"][n], 2),
                         "All-locks-N": round(curves["All-locks"][n], 2)})
    return write_table("T19_speedup_vs_window", pd.DataFrame(rows))


def t20_speedup_vs_qsize(
    *,
    dataset: str = "netflow",
    window: int = 1000,
    qsizes: tuple[int, ...] = (6, 9, 12, 15, 18, 21),
    n_edges: int = 3000,
    threads: tuple[int, ...] = (1, 2, 4, 8, 16),
    seed: int = 0,
) -> pd.DataFrame:
    stream = DATASETS[dataset](n_edges, seed=seed)
    rows = []
    for qsize in qsizes:
        gq = generate_query(stream, qsize, order_mode="random", seed=seed + qsize)
        traces = trace_transactions(gq.query, window, edges_from_pandas(stream))
        curves = speedup_curve(traces, list(threads))
        for n in threads:
            rows.append({"qsize": qsize, "threads": n,
                         "Timing-N": round(curves["Timing"][n], 2),
                         "All-locks-N": round(curves["All-locks"][n], 2)})
    return write_table("T20_speedup_vs_qsize", pd.DataFrame(rows))


# --------------------------------------------------------------------- #
# T21: decomposition/join-order ablation (Timing vs RD/RJ/RDJ)
# --------------------------------------------------------------------- #
def t21_optimizations(
    spark,
    *,
    dataset: str = "wikitalk",
    window: int = 900,  # paper fixes |W|=30000; SF-scaled
    qsizes: tuple[int, ...] = (9, 12),
    n_edges: int = 2000,
    batch: int = 250,
    n_queries: int = 3,
    seed: int = 0,
) -> pd.DataFrame:
    """Average over several random-order queries per size — a single
    query's RD/RJ draw can get lucky; the paper's figure averages 300."""
    stream = DATASETS[dataset](n_edges, seed=seed)
    rows = []
    for qsize in qsizes:
        for qi in range(n_queries):
            gq = generate_query(stream, qsize, order_mode="random",
                                seed=seed + 7 * qsize + qi)
            for method in ABLATIONS:
                eng = make_engine(method, spark, gq.query, window,
                                  stream=stream, seed=seed + qi)
                m = run_stream(eng, stream, batch)
                rows.append({"qsize": qsize, "query": qi, "method": method,
                             "throughput": round(m.throughput_norm, 2),
                             "wall_eps": round(m.throughput, 1),
                             "work": m.work,
                             "avg_space": round(m.avg_space, 1),
                             "matches": m.n_matches})
    long = pd.DataFrame(rows)
    out = long.pivot_table(index="qsize", columns="method",
                           values="throughput").reset_index()
    write_table("T21_optimizations_long", long)
    return write_table("T21_optimizations", out)


# --------------------------------------------------------------------- #
# T23/T24: varying decomposition size k at fixed |E(Q)| = 12
# --------------------------------------------------------------------- #
def sweep_k(
    spark,
    *,
    dataset: str = "wikitalk",
    ks: tuple[int, ...] = (1, 3, 6, 9, 12),
    qsize: int = 12,
    window: int = 900,
    n_edges: int = 2000,
    batch: int = 250,
    methods: tuple[str, ...] = ("Timing", "Timing-IND", "SJ-tree", "IncMat-quicksi"),
    seed: int = 0,
) -> pd.DataFrame:
    key = ("sweep_k", dataset, ks, qsize, window, n_edges, batch, methods, seed)
    if key in _CACHE:
        return _CACHE[key]
    stream = DATASETS[dataset](n_edges, seed=seed)
    rows = []
    for k in ks:
        gq = generate_query_with_k(stream, qsize, k, seed=seed + k)
        for method in methods:
            eng = make_engine(method, spark, gq.query, window, stream=stream)
            m = run_stream(eng, stream, batch)
            rows.append({"k": k, "method": method,
                         "throughput": round(m.throughput_norm, 2),
                         "wall_eps": round(m.throughput, 1),
                         "work": m.work,
                         "avg_space": round(m.avg_space, 1),
                         "matches": m.n_matches})
    df = pd.DataFrame(rows)
    _CACHE[key] = df
    return df


def t23_throughput_vs_k(spark, **kw) -> pd.DataFrame:
    df = sweep_k(spark, **kw)
    out = df.pivot_table(index="k", columns="method",
                         values="throughput").reset_index()
    return write_table("T23_throughput_vs_k", out)


def t24_space_vs_k(spark, **kw) -> pd.DataFrame:
    df = sweep_k(spark, **kw)
    out = df.pivot_table(index="k", columns="method",
                         values="avg_space").reset_index()
    return write_table("T24_space_vs_k", out)


# --------------------------------------------------------------------- #
# T25: selectivity of the generated query sets (per-edge engine — exact)
# --------------------------------------------------------------------- #
def t25_selectivity(
    *,
    dataset: str = "wikitalk",
    windows: tuple[int, ...] = (400, 800, 1200),
    qsizes: tuple[int, ...] = (6, 9, 12, 15),
    n_edges: int = 2000,
    n_queries: int = 3,
    seed: int = 0,
) -> pd.DataFrame:
    stream = DATASETS[dataset](n_edges, seed=seed)
    edges = edges_from_pandas(stream)
    rows = []
    for qsize in qsizes:
        qs = [
            generate_query(stream, qsize, order_mode=m, seed=seed + 17 * qsize + i)
            for i, m in enumerate(
                ["full", "empty"] + ["random"] * (n_queries - 2)
            )
        ]
        for window in windows:
            counts = []
            for gq in qs:
                eng = PyTimingEngine(gq.query, window)
                counts.append(len(eng.run_serial(edges)))
            rows.append({"qsize": qsize, "window": window,
                         "avg_answers": round(sum(counts) / len(counts), 1)})
    df = pd.DataFrame(rows)
    out = df.pivot_table(index="qsize", columns="window",
                         values="avg_answers").reset_index()
    return write_table("T25_selectivity", out)
