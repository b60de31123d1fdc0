"""Run engines over streams and collect the paper's metrics.

``run_stream`` drives any engine exposing
``process_batch(pandas) -> BatchResult`` over a chronological stream in
micro-batches and reports throughput (edges/s — Figs 15/16/21/23),
average space (stored cells/nodes — Figs 17/18/24) and the reported
matches (selectivity — Fig 25). ``make_engine`` is the method registry
used by every table.
"""
from __future__ import annotations

import random
import time
from collections import Counter
from dataclasses import dataclass

import pandas as pd
from pyspark.sql import SparkSession

from ..baselines.incmat import IncMatEngine
from ..baselines.sjtree import SJTreeEngine
from ..baselines.static_iso import term_frequencies
from ..core.engine import TimingEngine, TimingIndEngine
from ..core.query import QueryGraph
from ..decompose import decompose

METHODS = [
    "Timing",
    "Timing-IND",
    "SJ-tree",
    "IncMat-quicksi",
    "IncMat-turboiso",
    "IncMat-boostiso",
]
ABLATIONS = ["Timing", "Timing-RD", "Timing-RJ", "Timing-RDJ"]


def make_engine(
    name: str,
    spark: SparkSession,
    query: QueryGraph,
    window: int,
    *,
    stream: pd.DataFrame | None = None,
    seed: int = 0,
):
    """Instantiate a method by its §VII name."""
    rng = random.Random(seed)
    if name == "Timing":
        return TimingEngine(spark, query, window)
    if name == "Timing-IND":
        return TimingIndEngine(spark, query, window)
    if name == "Timing-RD":
        d = decompose(query, strategy="random", rng=rng)
        e = TimingEngine(spark, query, window, decomposition=d)
        e.name = name
        return e
    if name == "Timing-RJ":
        d = decompose(query, join_order="random", rng=rng)
        e = TimingEngine(spark, query, window, decomposition=d)
        e.name = name
        return e
    if name == "Timing-RDJ":
        d = decompose(query, strategy="random", join_order="random", rng=rng)
        e = TimingEngine(spark, query, window, decomposition=d)
        e.name = name
        return e
    if name == "SJ-tree":
        return SJTreeEngine(spark, query, window)
    if name.startswith("IncMat-"):
        freq = term_frequencies(stream) if stream is not None else Counter()
        return IncMatEngine(
            spark, query, window, strategy=name.split("-", 1)[1], term_freq=freq
        )
    raise ValueError(f"unknown method {name!r}")


@dataclass
class RunMetrics:
    method: str
    n_edges: int
    elapsed_s: float
    n_matches: int
    avg_space: float
    work: int  # partial-match rows touched over the run (Theorem 3/7 cost)
    matches: pd.DataFrame

    @property
    def throughput(self) -> float:
        """Wall-clock edges/s — substrate-bound at reproduction SF."""
        return self.n_edges / self.elapsed_s if self.elapsed_s else float("inf")

    @property
    def throughput_norm(self) -> float:
        """Edges per 1K partial-match operations — the algorithmic
        throughput the paper's C++ numbers track (EXPERIMENTS.md)."""
        return 1000.0 * self.n_edges / max(1, self.work)


def batches(stream: pd.DataFrame, batch_size: int):
    for s in range(0, len(stream), batch_size):
        yield stream.iloc[s : s + batch_size]


def run_stream(engine, stream: pd.DataFrame, batch_size: int) -> RunMetrics:
    """Feed the stream in chronological micro-batches; collect metrics."""
    frames: list[pd.DataFrame] = []
    spaces: list[int] = []
    work = 0
    t0 = time.perf_counter()
    for b in batches(stream, batch_size):
        res = engine.process_batch(b)
        frames.append(res.matches)
        spaces.append(res.space.ms_nodes)
        work = res.work
    elapsed = time.perf_counter() - t0
    matches = pd.concat(frames, ignore_index=True) if frames else pd.DataFrame()
    return RunMetrics(
        method=getattr(engine, "name", type(engine).__name__),
        n_edges=len(stream),
        elapsed_s=elapsed,
        n_matches=len(matches),
        avg_space=sum(spaces) / len(spaces) if spaces else 0.0,
        work=work,
        matches=matches,
    )
