"""SJ-tree baseline (Choudhury et al., EDBT'15) — §VII-C's closest rival.

A left-deep subgraph-join tree maintained incrementally: item ``Lʲ``
stores *all* matches of the first ``j`` query edges in a fixed
prefix-connected order, **without timing-order pruning** — an incoming
edge may extend partial matches in any position, so deltas need the
full bilinear rule (including retroactive joins against buffered window
edges, which Timing provably never needs). Timing order is verified
*posteriorly* on complete matches only, exactly how the paper runs this
baseline. The cost of ignoring ``≺`` during maintenance is the paper's
headline: SJ-tree stores every discardable partial match.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..core.engine import (
    EDGE_COLS,
    BatchResult,
    Item,
    SpaceSample,
    _pandas_matches_edge,
)
from ..core.matcher import (
    EDGE_SCHEMA,
    SubQuery,
    edge_partials,
    empty_partials,
    join_partials,
    to_match_frame,
)
from ..core.query import QueryGraph


def bfs_edge_order(query: QueryGraph) -> list[int]:
    """Deterministic prefix-connected join order (no timing information)."""
    order = [0]
    verts = set(query.edges[0].vertices)
    remaining = set(range(1, query.n_edges))
    while remaining:
        nxt = min(e for e in remaining if query.edges[e].vertices & verts)
        order.append(nxt)
        remaining.discard(nxt)
        verts |= query.edges[nxt].vertices
    return order


class SJTreeEngine:
    """Incremental subgraph join tree; timing checked as a post-filter."""

    name = "SJ-tree"

    def __init__(self, spark: SparkSession, query: QueryGraph, window: int) -> None:
        self.spark = spark
        self.query = query
        self.window = int(window)
        self.order = bfs_edge_order(query)
        self.items: list[Item] = []
        for j in range(len(self.order)):
            sub = SubQuery.of(query, self.order[: j + 1])
            self.items.append(Item(sub, empty_partials(spark, sub)))
        # window buffer of single-edge matches per query edge (needed for
        # the retroactive delta term Δ(Lʲ⁻¹) ⋈ Ω_old(εⱼ))
        self.edge_buf: dict[int, Item] = {
            e: Item(SubQuery.of(query, [e]), empty_partials(spark, SubQuery.of(query, [e])))
            for e in range(query.n_edges)
        }
        self._last_ts: int | None = None
        self.work = 0  # partial-match rows touched (see TimingEngine.work)
        from ..core.sqlgen import match_columns

        self._empty_report = pd.DataFrame(columns=match_columns(query))

    # ------------------------------------------------------------------ #
    def _join(self, left, lsub, right, rsub) -> DataFrame:
        out, _ = join_partials(
            left, lsub, right, rsub, self.query, self.window, use_timing=False
        )
        return out

    def _timing_filter(self, df: DataFrame) -> DataFrame:
        cond = F.lit(True)
        for a, b in sorted(self.query.order):
            cond = cond & (F.col(f"t{a}") < F.col(f"t{b}"))
        return df.filter(cond)

    def process_batch(self, batch: pd.DataFrame) -> BatchResult:
        assert len(batch) > 0 and batch["ts"].is_monotonic_increasing
        t_hi = int(batch["ts"].iloc[-1])
        if self._last_ts is not None:
            assert int(batch["ts"].iloc[0]) > self._last_ts
        self._last_ts = t_hi

        any_match = any(
            _pandas_matches_edge(batch, self.query, e)
            for e in range(self.query.n_edges)
        )
        bdf = (
            self.spark.createDataFrame(batch[EDGE_COLS], EDGE_SCHEMA)
            if any_match
            else None
        )
        cand: dict[int, tuple[DataFrame, int]] = {}
        persisted: list[DataFrame] = []
        if bdf is not None:
            for e in range(self.query.n_edges):
                if _pandas_matches_edge(batch, self.query, e):
                    df = edge_partials(bdf, self.query, e).persist()
                    persisted.append(df)
                    cand[e] = (df, df.count())

        # buffer maintenance: every matching edge is appended to its Ω(ε)
        # window buffer (symmetric with Timing's level-1 insert charge)
        self.work += sum(n for _, n in cand.values())

        deltas: list[tuple[DataFrame | None, int]] = []
        for j, eid in enumerate(self.order):
            if j == 0:
                # L¹ ≡ the Ω(ε_first) buffer — already charged above
                c = cand.get(eid)
                deltas.append((c[0], c[1]) if c else (None, 0))
                continue
            prev_item = self.items[j - 1]
            prev_delta, prev_n = deltas[j - 1]
            c = cand.get(eid)
            ebuf = self.edge_buf[eid]
            esub = ebuf.sub
            terms: list[DataFrame] = []
            # retroactive: new partials × old window edges of ε_j
            if prev_delta is not None and ebuf.n > 0:
                terms.append(self._join(prev_delta, prev_item.sub, ebuf.df, esub))
                # nested-loop comparisons: each new partial scans the whole
                # per-edge window buffer (the upward propagation SJ-tree pays
                # because it cannot prune by timing order)
                self.work += prev_n * ebuf.n
            # forward: all (old ∪ new) partials × new edges of ε_j
            if c is not None and (prev_item.n > 0 or prev_delta is not None):
                omega_new = (
                    prev_item.df.unionByName(prev_delta)
                    if prev_delta is not None
                    else prev_item.df
                )
                terms.append(self._join(omega_new, prev_item.sub, c[0], esub))
                self.work += (prev_item.n + prev_n) * c[1] + c[1]
            if not terms:
                deltas.append((None, 0))
            else:
                d = terms[0] if len(terms) == 1 else terms[0].unionByName(terms[1])
                d = d.persist()
                n = d.count()
                if n == 0:
                    d.unpersist()
                    deltas.append((None, 0))
                else:
                    persisted.append(d)
                    deltas.append((d, n))
                self.work += n

        if deltas[-1][0] is None:
            matches = self._empty_report
        else:
            matches = to_match_frame(
                self._timing_filter(deltas[-1][0]), self.query
            ).toPandas()

        for item, (delta, _) in zip(self.items, deltas):
            self._update(item, delta, t_hi)
        for eid, item in self.edge_buf.items():
            c = cand.get(eid)
            self._update(item, c[0] if c else None, t_hi)
        for df in persisted:
            df.unpersist()
        return BatchResult(len(matches), matches, self.space_sample(), self.work)

    def _update(self, item: Item, delta, t_hi: int) -> None:
        expiring = item.oldest is not None and item.oldest <= t_hi - self.window
        if delta is None and not expiring:
            return
        if expiring:
            # "in SJ-tree, all partial matches need to be enumerated to find
            # the expired ones" (§VII-C1) — charge the full scan
            self.work += item.n
        df = item.df.unionByName(delta) if delta is not None else item.df
        df = df.filter(F.col("mn") > F.lit(t_hi - self.window))
        df = df.localCheckpoint(eager=False)  # materialised by the stats agg
        stats = df.agg(F.count(F.lit(1)).alias("n"), F.min("mn").alias("o")).first()
        item.df, item.n = df, int(stats["n"])
        item.oldest = None if stats["o"] is None else int(stats["o"])

    def space_sample(self) -> SpaceSample:
        cells = sum((j + 1) * item.n for j, item in enumerate(self.items))
        buffered = sum(item.n for item in self.edge_buf.values())
        return SpaceSample(
            ms_nodes=cells + buffered,
            ind_cells=cells + buffered,
            window_edges=buffered,
        )
