"""Shared test helpers: canonical match comparison + the Fig 5 running example."""
from __future__ import annotations

import duckdb
import pandas as pd

from repro.core.query import QueryGraph
from repro.core.sqlgen import match_columns, reported_matches_sql


def paper_query() -> QueryGraph:
    """The paper's running example Q (Fig 5), reconstructed.

    Six edges ε1..ε6 (eids 0..5), timing order ε3≺ε1≺ε2, ε6≺ε5≺ε4; the
    structure is chosen so that TCsub(Q) is exactly the 10 subqueries the
    paper lists in §VI-B and the greedy decomposition is
    {ε6,ε5,ε4}, {ε3,ε1}, {ε2} (Fig 9).
    """
    # vertices 0..4 labelled a..e
    vlabels = {0: "a", 1: "b", 2: "c", 3: "d", 4: "e"}
    edges = [
        (4, 0),  # ε1 = eid 0 : E→A
        (2, 1),  # ε2 = eid 1 : C→B
        (3, 4),  # ε3 = eid 2 : D→E
        (2, 3),  # ε4 = eid 3 : C→D
        (1, 2),  # ε5 = eid 4 : B→C
        (0, 1),  # ε6 = eid 5 : A→B
    ]
    # ε3≺ε1, ε1≺ε2, ε6≺ε5, ε5≺ε4
    order = [(2, 0), (0, 1), (5, 4), (4, 3)]
    return QueryGraph(vlabels, edges, order)


def match_keyset(df: pd.DataFrame, query: QueryGraph) -> list[tuple]:
    """Sorted canonical rows for set comparison of match results."""
    cols = sorted(match_columns(query))
    if len(df) == 0:
        return []
    return sorted(map(tuple, df[cols].astype("int64").values.tolist()))


def oracle_reported(stream: pd.DataFrame, query: QueryGraph, window: int) -> pd.DataFrame:
    """All matches ever reported over the stream, per the DuckDB oracle."""
    con = duckdb.connect()
    try:
        con.register("edges", stream)
        return con.execute(reported_matches_sql(query, window)).fetchdf()
    finally:
        con.close()


def reports_to_frame(reports: list[dict], query: QueryGraph) -> pd.DataFrame:
    cols = match_columns(query)
    if not reports:
        return pd.DataFrame(columns=cols)
    return pd.DataFrame(reports)[cols]
