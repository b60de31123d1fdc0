"""The paper's engine on Spark: expansion lists maintained per micro-batch.

``TimingEngine`` holds one DataFrame per expansion-list item — the items
``Lᵢʲ`` of every TC-subquery ``Qⁱ`` plus the global list ``L₀`` over the
decomposition (Alg 1/2, §III). Each micro-batch:

1. per TC-subquery with timing sequence ``[q₁..qₘ]``:
   ``Δ(L¹)=edges(B,q₁)``, ``Δ(Lʲ)=Ω_new(Lʲ⁻¹) ⋈ᵀ edges(B,qⱼ)``.
   (Because ``qⱼ₋₁ ≺ qⱼ`` and old edges precede all batch edges, the
   retroactive term ``Δ(Lʲ⁻¹) ⋈ᵀ old-edges(qⱼ)`` is provably empty —
   Theorem 2 in batch form.)
2. ``Δ(L₀ⁱ) = Δ(L₀ⁱ⁻¹) ⋈ᵀ Ω_old(Qⁱ)  ∪  Ω_new(L₀ⁱ⁻¹) ⋈ᵀ Δ(Qⁱ)``.
3. report ``Δ(L₀ᵏ)``; expire all items by ``mn > t_hi − |W|`` and
   ``localCheckpoint`` to truncate lineage.

Window validity is enforced *inside* every join at match-creation time,
so reported matches are independent of batch size — the batched engine
is observationally identical to the paper's per-edge Algorithms 1/2
(tested in ``tests/test_engine_batching.py``).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..decompose import decompose
from .matcher import (
    EDGE_SCHEMA,
    SubQuery,
    edge_partials,
    empty_partials,
    join_partials,
    to_match_frame,
)
from .query import Decomposition, QueryGraph

EDGE_COLS = [f.name for f in EDGE_SCHEMA.fields]


@dataclass
class Item:
    """One expansion-list item: its subquery, stored matches, and stats."""

    sub: SubQuery
    df: DataFrame
    n: int = 0
    oldest: int | None = None  # min(mn) of stored rows; None when empty


@dataclass
class SpaceSample:
    """Space metrics after one batch (unit = stored edge-slot / tree node)."""

    ms_nodes: int  # MS-tree: one node per stored partial match (+ L₀ pointers)
    ind_cells: int  # independent storage: one slot per (match, constituent edge)
    window_edges: int  # raw edges buffered (0 for Timing — it keeps none)


@dataclass
class BatchResult:
    n_matches: int
    matches: pd.DataFrame  # canonical match columns; may be empty
    space: SpaceSample
    work: int = 0  # cumulative partial-match rows touched (Theorem 3 cost)


def _pandas_matches_edge(batch: pd.DataFrame, query: QueryGraph, eid: int) -> bool:
    """Driver-side pre-check: does any batch edge match query edge ``eid``?"""
    q = query.edges[eid]
    m = (batch["slabel"] == query.vlabels[q.src]) & (
        batch["dlabel"] == query.vlabels[q.dst]
    )
    if q.elabel is not None:
        m &= batch["elabel"] == q.elabel
    m &= (batch["src"] == batch["dst"]) if q.src == q.dst else (
        batch["src"] != batch["dst"]
    )
    return bool(m.any())


class TimingEngine:
    """The paper's method ("Timing"): TC decomposition + expansion lists."""

    name = "Timing"

    def __init__(
        self,
        spark: SparkSession,
        query: QueryGraph,
        window: int,
        decomposition: Decomposition | None = None,
    ) -> None:
        self.spark = spark
        self.query = query
        self.window = int(window)
        self.decomp = decomposition or decompose(query)
        self.parts = self.decomp.parts
        self.part_items: list[list[Item]] = []
        for seq in self.parts:
            items = []
            for j in range(len(seq)):
                sub = SubQuery.of(query, seq[: j + 1])
                items.append(Item(sub, empty_partials(spark, sub)))
            self.part_items.append(items)
        self.l0_items: list[Item] = []
        if len(self.parts) > 1:
            for i in range(len(self.parts)):
                eids = [e for p in self.parts[: i + 1] for e in p]
                sub = SubQuery.of(query, eids)
                self.l0_items.append(Item(sub, empty_partials(spark, sub)))
        self._last_ts: int | None = None
        from .sqlgen import match_columns

        self._empty_report = pd.DataFrame(columns=match_columns(query))
        # Cumulative algorithmic work: partial-match rows read, produced and
        # expired. At reproduction scale wall-clock is Spark-overhead-bound,
        # so the experiments report this alongside wall throughput — it is
        # the quantity Theorem 3/7's cost model counts (EXPERIMENTS.md).
        self.work = 0
        self._ind_maintenance = False  # Timing-IND: expiry scans whole items

    # ------------------------------------------------------------------ #
    def _candidates(
        self, batch: pd.DataFrame, bdf: DataFrame | None
    ) -> dict[int, tuple[DataFrame, int]]:
        cand: dict[int, tuple[DataFrame, int]] = {}
        if bdf is None:
            return cand
        for eid in range(self.query.n_edges):
            if _pandas_matches_edge(batch, self.query, eid):
                df = edge_partials(bdf, self.query, eid).persist()
                cand[eid] = (df, df.count())
        return cand

    def _join(
        self,
        left: DataFrame,
        left_sub: SubQuery,
        right: DataFrame,
        right_sub: SubQuery,
    ) -> DataFrame:
        out, _ = join_partials(
            left, left_sub, right, right_sub, self.query, self.window
        )
        return out

    # ------------------------------------------------------------------ #
    def process_batch(self, batch: pd.DataFrame) -> BatchResult:
        """Ingest one chronological micro-batch; return newly reported matches."""
        assert len(batch) > 0, "empty batch"
        assert batch["ts"].is_monotonic_increasing, "batch must be time-ordered"
        t_lo, t_hi = int(batch["ts"].iloc[0]), int(batch["ts"].iloc[-1])
        if self._last_ts is not None:
            assert t_lo > self._last_ts, "batches must be chronological"
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
        cand = self._candidates(batch, bdf)
        persisted: list[DataFrame] = [df for df, _ in cand.values()]

        def materialize(df: DataFrame) -> tuple[DataFrame | None, int]:
            """Persist + count a delta; empty deltas collapse to None."""
            df = df.persist()
            n = df.count()
            if n == 0:
                df.unpersist()
                return None, 0
            persisted.append(df)
            return df, n

        # --- Step 1: per-TC-subquery expansion-list deltas -------------- #
        all_deltas: list[list[tuple[DataFrame | None, int]]] = []
        for i, seq in enumerate(self.parts):
            deltas: list[tuple[DataFrame | None, int]] = []
            for j, eid in enumerate(seq):
                if j == 0:
                    c = cand.get(eid)
                    d = (c[0], c[1]) if c else (None, 0)
                    self.work += d[1]
                else:
                    prev_item = self.part_items[i][j - 1]
                    prev_delta, prev_n = deltas[j - 1]
                    c = cand.get(eid)
                    if c is None or (prev_item.n == 0 and prev_delta is None):
                        d = (None, 0)
                    else:
                        omega_new = (
                            prev_item.df.unionByName(prev_delta)
                            if prev_delta is not None
                            else prev_item.df
                        )
                        # Theorem 3: the join reads Ω(Lʲ⁻¹) once per batch edge
                        self.work += (prev_item.n + prev_n) * c[1] + c[1]
                        out = self._join(
                            omega_new,
                            prev_item.sub,
                            c[0],
                            SubQuery.of(self.query, [eid]),
                        )
                        d = materialize(out)
                        self.work += d[1]
                deltas.append(d)
            all_deltas.append(deltas)
        part_deltas = [ds[-1] for ds in all_deltas]

        # --- Step 2: L₀ deltas (k>1) ------------------------------------ #
        if len(self.parts) == 1:
            report_delta = part_deltas[0][0]
            l0_deltas: list[tuple[DataFrame | None, int]] = []
        else:
            l0_deltas = [part_deltas[0]]
            for i in range(1, len(self.parts)):
                old_q = self.part_items[i][-1]  # Ω_old(Qⁱ): state not yet mutated
                prev_l0 = self.l0_items[i - 1]
                prev_delta, prev_n = l0_deltas[i - 1]
                pd_i, pd_n = part_deltas[i]
                terms: list[DataFrame] = []
                if prev_delta is not None and old_q.n > 0:
                    terms.append(
                        self._join(prev_delta, prev_l0.sub, old_q.df, old_q.sub)
                    )
                    self.work += prev_n * old_q.n
                if pd_i is not None and (prev_l0.n > 0 or prev_delta is not None):
                    omega_new = (
                        prev_l0.df.unionByName(prev_delta)
                        if prev_delta is not None
                        else prev_l0.df
                    )
                    q_sub = SubQuery.of(self.query, self.parts[i])
                    terms.append(self._join(omega_new, prev_l0.sub, pd_i, q_sub))
                    self.work += (prev_l0.n + prev_n) * pd_n
                if not terms:
                    l0_deltas.append((None, 0))
                else:
                    d = terms[0] if len(terms) == 1 else terms[0].unionByName(terms[1])
                    d, n = materialize(d)
                    self.work += n
                    l0_deltas.append((d, n))
            report_delta = l0_deltas[-1][0]

        # --- Step 3: report, expire, checkpoint -------------------------- #
        if report_delta is None:
            matches = self._empty_report
        else:
            # report_delta is persisted; toPandas materialises the cache the
            # state updates below will reuse — no extra checkpoint needed.
            matches = to_match_frame(report_delta, self.query).toPandas()

        for items, deltas in zip(self.part_items, all_deltas):
            for item, (delta, dn) in zip(items, deltas):
                self._update_item(item, delta, t_hi, dn)
        for item, (delta, dn) in zip(self.l0_items, l0_deltas):
            self._update_item(item, delta, t_hi, dn)

        for df in persisted:
            df.unpersist()
        return BatchResult(len(matches), matches, self.space_sample(), self.work)

    # ------------------------------------------------------------------ #
    def _update_item(
        self, item: Item, delta: DataFrame | None, t_hi: int, delta_n: int = 0
    ) -> None:
        """Union the delta in, expire by window end, checkpoint, refresh stats."""
        expiring = item.oldest is not None and item.oldest <= t_hi - self.window
        if delta is None and not expiring:
            return
        n_before = item.n
        df = item.df.unionByName(delta) if delta is not None else item.df
        df = df.filter(F.col("mn") > F.lit(t_hi - self.window))
        # Lazy checkpoint: the stats aggregation right below materialises it,
        # so lineage truncation costs one Spark job, not two.
        df = df.localCheckpoint(eager=False)
        stats = df.agg(
            F.count(F.lit(1)).alias("n"), F.min("mn").alias("oldest")
        ).first()
        item.df, item.n = df, int(stats["n"])
        item.oldest = None if stats["oldest"] is None else int(stats["oldest"])
        if expiring:
            # MS-tree deletion touches only the expired partial matches
            # (Alg 2 / §IV-B); the IND strawman scans the whole item.
            expired = max(0, n_before + delta_n - item.n)
            self.work += n_before if self._ind_maintenance else expired

    # ------------------------------------------------------------------ #
    def space_sample(self) -> SpaceSample:
        """MS-tree vs IND storage cost of the current state (DESIGN §3.4)."""
        ms = 0
        ind = 0
        for items in self.part_items:
            for j, item in enumerate(items):
                ms += item.n  # one tree node per stored match
                ind += item.n * (j + 1)  # full tuple: one slot per edge
        for item in self.l0_items:
            ms += item.n  # pointer node into the subquery trees
            ind += item.n * len(item.sub.edges)
        return SpaceSample(ms_nodes=ms, ind_cells=ind, window_edges=0)


class TimingIndEngine(TimingEngine):
    """Timing-IND: identical maintenance, but space is counted uncompressed.

    In the relational substrate both variants materialise full tuples; the
    paper's Timing/Timing-IND contrast is (a) storage — reproduced exactly
    by :meth:`space_sample` — and (b) maintenance constants, reproduced
    operationally by the pointer-based stores in ``core/mstree.py``.
    """

    name = "Timing-IND"

    def __init__(self, *args, **kwargs) -> None:
        super().__init__(*args, **kwargs)
        self._ind_maintenance = True

    def space_sample(self) -> SpaceSample:
        s = super().space_sample()
        return SpaceSample(ms_nodes=s.ind_cells, ind_cells=s.ind_cells, window_edges=0)
