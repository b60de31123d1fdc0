"""Relational encoding of partial matches and the time-constrained join ⋈ᵀ.

A partial match of a subquery ``S`` (a set of query-edge ids) is one row:

* ``v{u}``  — data vertex mapped to query vertex ``u``, for each ``u ∈ V(S)``
* ``e{q}``/``t{q}`` — data edge id / timestamp per query edge ``q ∈ S``
* ``mn``/``mx``     — min/max constituent timestamp (window bookkeeping)

``join_partials`` implements ``Ω(S₁) ⋈ᵀ Ω(S₂)`` (§III): shared query
vertices become equi-join keys, bijectivity becomes pairwise ``≠`` over
the non-shared vertex images, every ``≺`` pair crossing the two sides
becomes ``t_a < t_b``, and window validity *at match-creation time*
(``least(mn) > greatest(mx) − |W|``) is checked inside the join — which
is what makes the micro-batched engine equivalent to per-edge
processing (DESIGN.md §3.3).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import Column, DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from .query import QueryGraph

EDGE_SCHEMA = T.StructType(
    [
        T.StructField("eid", T.LongType(), False),
        T.StructField("ts", T.LongType(), False),
        T.StructField("src", T.LongType(), False),
        T.StructField("dst", T.LongType(), False),
        T.StructField("slabel", T.StringType(), False),
        T.StructField("dlabel", T.StringType(), False),
        T.StructField("elabel", T.StringType(), True),
    ]
)


@dataclass(frozen=True)
class SubQuery:
    """A subquery as an edge-id set, with the vertex set it induces."""

    edges: frozenset[int]
    vertices: frozenset[int]

    @staticmethod
    def of(query: QueryGraph, eids) -> "SubQuery":
        eids = frozenset(eids)
        return SubQuery(eids, query.edge_vertices(eids))


def partial_columns(sub: SubQuery) -> list[str]:
    """Canonical column list for a partial-match DataFrame of ``sub``."""
    return (
        [f"v{u}" for u in sorted(sub.vertices)]
        + [f"e{q}" for q in sorted(sub.edges)]
        + [f"t{q}" for q in sorted(sub.edges)]
        + ["mn", "mx"]
    )


def empty_partials(spark: SparkSession, sub: SubQuery) -> DataFrame:
    """An empty partial-match DataFrame with the canonical schema."""
    fields = [T.StructField(c, T.LongType(), False) for c in partial_columns(sub)]
    return spark.createDataFrame([], T.StructType(fields))


def edge_partials(edges: DataFrame, query: QueryGraph, eid: int) -> DataFrame:
    """Single-edge partial matches: data edges matching query edge ``eid``."""
    q = query.edges[eid]
    cond = (F.col("slabel") == query.vlabels[q.src]) & (
        F.col("dlabel") == query.vlabels[q.dst]
    )
    if q.elabel is not None:
        cond = cond & (F.col("elabel") == q.elabel)
    if q.src == q.dst:
        cond = cond & (F.col("src") == F.col("dst"))
        cols = [F.col("src").alias(f"v{q.src}")]
    else:
        cond = cond & (F.col("src") != F.col("dst"))
        cols = [F.col("src").alias(f"v{q.src}"), F.col("dst").alias(f"v{q.dst}")]
    out = edges.filter(cond).select(
        *cols,
        F.col("eid").alias(f"e{eid}"),
        F.col("ts").alias(f"t{eid}"),
        F.col("ts").alias("mn"),
        F.col("ts").alias("mx"),
    )
    sub = SubQuery.of(query, [eid])
    return out.select(*partial_columns(sub))


def join_partials(
    left: DataFrame,
    left_sub: SubQuery,
    right: DataFrame,
    right_sub: SubQuery,
    query: QueryGraph,
    window: int,
    *,
    use_timing: bool = True,
    require_connected: bool = True,
) -> tuple[DataFrame, SubQuery]:
    """``Ω(left_sub) ⋈ᵀ Ω(right_sub)`` with window validity at creation time.

    ``use_timing=False`` drops the ``≺`` predicates — used by the SJ-tree
    baseline, which post-filters timing order instead of pruning with it.
    """
    assert not (left_sub.edges & right_sub.edges), "subqueries must be edge-disjoint"
    shared = left_sub.vertices & right_sub.vertices
    if require_connected:
        assert shared, "⋈ᵀ of disconnected subqueries would be a Cartesian product"

    ren = {c: f"__r_{c}" for c in right.columns}
    r = right.select(*[F.col(c).alias(n) for c, n in ren.items()])

    conds: list[Column] = []
    for u in sorted(shared):
        conds.append(F.col(f"v{u}") == F.col(f"__r_v{u}"))
    # Bijectivity across the non-shared vertex images (within-side
    # distinctness holds inductively from edge_partials / prior joins).
    for u1 in sorted(left_sub.vertices - shared):
        for u2 in sorted(right_sub.vertices - shared):
            conds.append(F.col(f"v{u1}") != F.col(f"__r_v{u2}"))
    if use_timing:
        for a, b in sorted(query.order):
            if a in left_sub.edges and b in right_sub.edges:
                conds.append(F.col(f"t{a}") < F.col(f"__r_t{b}"))
            elif b in left_sub.edges and a in right_sub.edges:
                conds.append(F.col(f"__r_t{a}") < F.col(f"t{b}"))
    mn = F.least(F.col("mn"), F.col("__r_mn"))
    mx = F.greatest(F.col("mx"), F.col("__r_mx"))
    conds.append(mn > mx - F.lit(window))

    cond = conds[0]
    for c in conds[1:]:
        cond = cond & c

    out_sub = SubQuery.of(query, left_sub.edges | right_sub.edges)
    joined = left.join(r, cond, "inner")
    proj = []
    for u in sorted(out_sub.vertices):
        proj.append(F.col(f"v{u}") if u in left_sub.vertices else F.col(f"__r_v{u}"))
        proj[-1] = proj[-1].alias(f"v{u}")
    for q in sorted(out_sub.edges):
        src = f"e{q}" if q in left_sub.edges else f"__r_e{q}"
        proj.append(F.col(src).alias(f"e{q}"))
    for q in sorted(out_sub.edges):
        src = f"t{q}" if q in left_sub.edges else f"__r_t{q}"
        proj.append(F.col(src).alias(f"t{q}"))
    proj.append(mn.alias("mn"))
    proj.append(mx.alias("mx"))
    return joined.select(*proj), out_sub


def to_match_frame(df: DataFrame, query: QueryGraph) -> DataFrame:
    """Project a full-match partial frame to the canonical oracle columns."""
    from .sqlgen import match_columns

    return df.select(*match_columns(query))
