"""IncMat baseline (Fan et al., TODS'13): re-search the affected area.

No partial matches are kept. On every update the engine (1) extracts the
*affected area* — the subgraph induced by vertices within ``d`` hops
(d = query diameter) of the updated edges' endpoints — and (2) runs a
static subgraph-isomorphism pipeline over it with the chosen published
strategy's matching order/filtering (``static_iso``), keeping matches
that use at least one batch edge, then (3) post-filters timing order.
This is exactly why it loses: the affected area grows with the query
diameter and the whole search recurs per update, while Timing's
expansion lists only touch one item per incoming edge.
"""
from __future__ import annotations

from collections import Counter

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..core.engine import EDGE_COLS, BatchResult, SpaceSample, _pandas_matches_edge
from ..core.matcher import (
    EDGE_SCHEMA,
    SubQuery,
    edge_partials,
    join_partials,
    to_match_frame,
)
from ..core.query import QueryGraph
from .static_iso import matching_order, query_degrees, uses_degree_filter


class IncMatEngine:
    """Affected-area re-matching with a static algorithm per update."""

    def __init__(
        self,
        spark: SparkSession,
        query: QueryGraph,
        window: int,
        strategy: str = "quicksi",
        term_freq: Counter | None = None,
    ) -> None:
        self.spark = spark
        self.query = query
        self.window = int(window)
        self.strategy = strategy
        self.name = f"IncMat-{strategy}"
        self.order = matching_order(query, strategy, term_freq or Counter())
        self.diameter = query.diameter()
        # the window graph (adjacency) IncMat must keep to search over
        self.buffer = pd.DataFrame(columns=EDGE_COLS)
        self._last_space = SpaceSample(0, 0, 0)
        self._last_ts: int | None = None
        self.work = 0  # rows touched: area extraction + re-match intermediates

    # ------------------------------------------------------------------ #
    def _affected_area(self, snap: DataFrame, batch: pd.DataFrame) -> DataFrame:
        """Edges of the snapshot within d hops of the batch endpoints."""
        seeds = self.spark.createDataFrame(
            pd.DataFrame(
                {"vid": pd.unique(pd.concat([batch["src"], batch["dst"]]))}
            )
        )
        verts = seeds
        for _ in range(self.diameter):
            outn = snap.join(verts, snap.src == verts.vid).select(
                F.col("dst").alias("vid")
            )
            inn = snap.join(verts, snap.dst == verts.vid).select(
                F.col("src").alias("vid")
            )
            verts = verts.unionByName(outn).unionByName(inn).distinct()
            verts = verts.localCheckpoint(eager=True)
        area = (
            snap.join(
                verts.withColumnRenamed("vid", "s_v"), F.col("src") == F.col("s_v")
            )
            .drop("s_v")
            .join(
                verts.withColumnRenamed("vid", "d_v"), F.col("dst") == F.col("d_v")
            )
            .drop("d_v")
        )
        return area.localCheckpoint(eager=True)

    def _degree_filtered(self, area: DataFrame) -> dict[int, DataFrame]:
        """NLF-style candidate pruning: data vertex degree ≥ query degree."""
        outdeg = area.groupBy("src").agg(F.count(F.lit(1)).alias("od"))
        indeg = area.groupBy("dst").agg(F.count(F.lit(1)).alias("id_"))
        deg = (
            outdeg.withColumnRenamed("src", "vid")
            .join(indeg.withColumnRenamed("dst", "vid"), "vid", "outer")
            .fillna(0)
            .localCheckpoint(eager=True)
        )
        qdeg = query_degrees(self.query)
        cands: dict[int, DataFrame] = {}
        for q in self.query.edges:
            c = edge_partials(area, self.query, q.eid)
            for vid, col in ((q.src, f"v{q.src}"), (q.dst, f"v{q.dst}")):
                qo, qi = qdeg[vid]
                d = deg.withColumnRenamed("vid", "__dv")
                c = (
                    c.join(d, F.col(col) == F.col("__dv"))
                    .filter((F.col("od") >= qo) & (F.col("id_") >= qi))
                    .drop("__dv", "od", "id_")
                )
                if q.src == q.dst:
                    break
            cands[q.eid] = c
        return cands

    # ------------------------------------------------------------------ #
    def process_batch(self, batch: pd.DataFrame) -> BatchResult:
        assert len(batch) > 0 and batch["ts"].is_monotonic_increasing
        t_lo, t_hi = int(batch["ts"].iloc[0]), int(batch["ts"].iloc[-1])
        if self._last_ts is not None:
            assert t_lo > self._last_ts
        self._last_ts = t_hi

        # snapshot relevant to any report in this batch: (t_lo − |W|, t_hi] —
        # computed BEFORE trimming to the batch-end window, else transient
        # matches completed early in the batch lose their oldest edges
        self.buffer = pd.concat([self.buffer, batch], ignore_index=True)
        relevant = self.buffer[self.buffer["ts"] > t_lo - self.window]
        self.buffer = self.buffer[self.buffer["ts"] > t_hi - self.window]

        any_match = any(
            _pandas_matches_edge(batch, self.query, e)
            for e in range(self.query.n_edges)
        )
        if not any_match:
            from ..core.sqlgen import match_columns

            matches = pd.DataFrame(columns=match_columns(self.query))
            self._last_space = SpaceSample(
                len(self.buffer), len(self.buffer), len(self.buffer)
            )
            return BatchResult(0, matches, self._last_space, self.work)

        snap = self.spark.createDataFrame(relevant[EDGE_COLS], EDGE_SCHEMA)
        snap = snap.localCheckpoint(eager=True)
        area = self._affected_area(snap, batch)
        n_area = area.count()
        # re-search from scratch: the whole affected area is touched every
        # batch, once per BFS hop (Fan et al.'s cost)
        self.work += n_area * max(1, self.diameter)

        if uses_degree_filter(self.strategy):
            cands = self._degree_filtered(area)
        else:
            cands = {
                q.eid: edge_partials(area, self.query, q.eid)
                for q in self.query.edges
            }

        df = cands[self.order[0]]
        sub = SubQuery.of(self.query, [self.order[0]])
        inter_cells = 0
        persisted = []
        for j, eid in enumerate(self.order[1:], start=1):
            df = df.persist()
            persisted.append(df)
            inter_cells += df.count() * j
            esub = SubQuery.of(self.query, [eid])
            df, sub = join_partials(
                df, sub, cands[eid], esub, self.query, self.window,
                use_timing=False,
            )
        # keep only matches completed by this batch, then timing post-filter
        df = df.filter(F.col("mx") >= F.lit(t_lo))
        cond = F.lit(True)
        for a, b in sorted(self.query.order):
            cond = cond & (F.col(f"t{a}") < F.col(f"t{b}"))
        report = df.filter(cond).localCheckpoint(eager=True)
        matches = to_match_frame(report, self.query).toPandas()
        for p in persisted:
            p.unpersist()
        self.work += inter_cells + len(matches)
        self._last_space = SpaceSample(
            ms_nodes=inter_cells + n_area + len(self.buffer),
            ind_cells=inter_cells + n_area + len(self.buffer),
            window_edges=len(self.buffer),
        )
        return BatchResult(len(matches), matches, self._last_space, self.work)

    def space_sample(self) -> SpaceSample:
        return self._last_space
