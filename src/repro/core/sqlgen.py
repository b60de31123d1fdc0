"""Compile a query graph into golden DuckDB SQL (the Def 4 semantics).

A time-constrained match over the snapshot ``(t−|W|, t]`` is exactly a
k-way self-join of the edge table: one alias per query edge, label
predicates, shared-endpoint equalities, pairwise-distinct vertex images
(bijectivity), and ``t_a < t_b`` per timing-order pair. This is the
*definitional* semantics — every engine in this repo is checked against
it via ``repro.oracle.assert_equivalent``.
"""
from __future__ import annotations

import itertools

from .query import QueryGraph


def match_columns(query: QueryGraph) -> list[str]:
    """Canonical output columns for a full match of ``query``.

    One vertex-image column per query vertex, then one edge-id and one
    timestamp column per query edge — the row shape every engine produces.
    """
    cols = [f"v{u}" for u in sorted(query.vertices)]
    cols += [f"e{q.eid}" for q in query.edges]
    cols += [f"t{q.eid}" for q in query.edges]
    return cols


def _core(query: QueryGraph, edges_table: str):
    """Shared SELECT/FROM/WHERE pieces minus any window condition."""
    aliases = {q.eid: f"q{q.eid}" for q in query.edges}
    vertex_expr: dict[int, str] = {}
    conds: list[str] = []
    for q in query.edges:
        a = aliases[q.eid]
        conds.append(f"{a}.slabel = '{query.vlabels[q.src]}'")
        conds.append(f"{a}.dlabel = '{query.vlabels[q.dst]}'")
        if q.elabel is not None:
            conds.append(f"{a}.elabel = '{q.elabel}'")
        if q.src == q.dst:
            conds.append(f"{a}.src = {a}.dst")
        for vid, side in ((q.src, "src"), (q.dst, "dst")):
            expr = f"{a}.{side}"
            if vid in vertex_expr:
                conds.append(f"{vertex_expr[vid]} = {expr}")
            else:
                vertex_expr[vid] = expr
    for u, v in itertools.combinations(sorted(vertex_expr), 2):
        conds.append(f"{vertex_expr[u]} <> {vertex_expr[v]}")
    for a, b in sorted(query.order):
        conds.append(f"{aliases[a]}.ts < {aliases[b]}.ts")
    select = ", ".join(
        [f"{vertex_expr[u]} AS v{u}" for u in sorted(query.vertices)]
        + [f"{aliases[q.eid]}.eid AS e{q.eid}" for q in query.edges]
        + [f"{aliases[q.eid]}.ts AS t{q.eid}" for q in query.edges]
    )
    from_clause = ", ".join(f"{edges_table} {aliases[q.eid]}" for q in query.edges)
    return select, from_clause, conds, aliases


def snapshot_match_sql(
    query: QueryGraph,
    window: int,
    t_now: int,
    edges_table: str = "edges",
) -> str:
    """SQL for all time-constrained matches over the snapshot at ``t_now``.

    ``edges_table`` must have columns (eid, ts, src, dst, slabel, dlabel,
    elabel).
    """
    select, from_clause, conds, aliases = _core(query, edges_table)
    for q in query.edges:
        a = aliases[q.eid]
        conds.append(f"{a}.ts > {t_now - window} AND {a}.ts <= {t_now}")
    where = "\n  AND ".join(conds)
    return f"SELECT {select}\nFROM {from_clause}\nWHERE {where}"


def reported_matches_sql(
    query: QueryGraph,
    window: int,
    edges_table: str = "edges",
) -> str:
    """SQL for *every match ever reported* while streaming ``edges_table``.

    A match is reported when its latest edge arrives, and is valid at that
    instant iff all constituent edges lie inside the window ending at that
    latest timestamp; so the reported set over the whole stream is the join
    with ``max(ts) − min(ts) < window``.
    """
    select, from_clause, conds, aliases = _core(query, edges_table)
    ts = [f"{aliases[q.eid]}.ts" for q in query.edges]
    hi = f"greatest({', '.join(ts)})" if len(ts) > 1 else ts[0]
    lo = f"least({', '.join(ts)})" if len(ts) > 1 else ts[0]
    conds.append(f"{hi} - {lo} < {window}")
    where = "\n  AND ".join(conds)
    return f"SELECT {select}\nFROM {from_clause}\nWHERE {where}"
