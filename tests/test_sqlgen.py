"""The DuckDB golden-SQL generator itself, checked on hand-built cases."""
import duckdb
import pandas as pd

from repro.core.query import QueryGraph, full_order_from_sequence
from repro.core.sqlgen import match_columns, reported_matches_sql, snapshot_match_sql


def edges_df(rows):
    return pd.DataFrame(
        rows, columns=["eid", "ts", "src", "dst", "slabel", "dlabel", "elabel"]
    )


def run(sql, edges):
    con = duckdb.connect()
    try:
        con.register("edges", edges)
        return con.execute(sql).fetchdf()
    finally:
        con.close()


def two_path():
    return QueryGraph({0: "a", 1: "b", 2: "c"}, [(0, 1), (1, 2)], [(0, 1)])


class TestSnapshotSQL:
    def test_simple_match(self):
        q = two_path()
        edges = edges_df(
            [(0, 1, 10, 20, "a", "b", None), (1, 2, 20, 30, "b", "c", None)]
        )
        out = run(snapshot_match_sql(q, window=10, t_now=2), edges)
        assert len(out) == 1
        assert set(out.columns) == set(match_columns(q))
        assert out.iloc[0]["v0"] == 10 and out.iloc[0]["v2"] == 30

    def test_timing_order_filters(self):
        q = two_path()
        # second edge arrives BEFORE the first → ε0≺ε1 violated
        edges = edges_df(
            [(0, 1, 20, 30, "b", "c", None), (1, 2, 10, 20, "a", "b", None)]
        )
        out = run(snapshot_match_sql(q, window=10, t_now=2), edges)
        assert len(out) == 0

    def test_window_filters(self):
        q = two_path()
        edges = edges_df(
            [(0, 1, 10, 20, "a", "b", None), (1, 9, 20, 30, "b", "c", None)]
        )
        assert len(run(snapshot_match_sql(q, window=5, t_now=9), edges)) == 0
        assert len(run(snapshot_match_sql(q, window=20, t_now=9), edges)) == 1

    def test_injectivity(self):
        """a→b→a with distinct query vertices must not map both to vertex 10."""
        q = QueryGraph({0: "a", 1: "b", 2: "a"}, [(0, 1), (1, 2)], [(0, 1)])
        edges = edges_df(
            [(0, 1, 10, 20, "a", "b", None), (1, 2, 20, 10, "b", "a", None)]
        )
        assert len(run(snapshot_match_sql(q, window=10, t_now=2), edges)) == 0
        edges2 = edges_df(
            [(0, 1, 10, 20, "a", "b", None), (1, 2, 20, 11, "b", "a", None)]
        )
        assert len(run(snapshot_match_sql(q, window=10, t_now=2), edges2)) == 1

    def test_edge_labels(self):
        q = QueryGraph({0: "a", 1: "b"}, [(0, 1, "x")])
        edges = edges_df(
            [(0, 1, 10, 20, "a", "b", "y"), (1, 2, 10, 21, "a", "b", "x")]
        )
        out = run(snapshot_match_sql(q, window=10, t_now=2), edges)
        assert list(out["e0"]) == [1]

    def test_parallel_data_edges_both_match(self):
        q = QueryGraph({0: "a", 1: "b"}, [(0, 1)])
        edges = edges_df(
            [(0, 1, 10, 20, "a", "b", None), (1, 2, 10, 20, "a", "b", None)]
        )
        out = run(snapshot_match_sql(q, window=10, t_now=2), edges)
        assert sorted(out["e0"]) == [0, 1]


class TestReportedSQL:
    def test_span_window(self):
        q = two_path()
        # edges 6 apart: reported under window 10, not under window 5
        edges = edges_df(
            [(0, 1, 10, 20, "a", "b", None), (1, 7, 20, 30, "b", "c", None)]
        )
        assert len(run(reported_matches_sql(q, 10), edges)) == 1
        assert len(run(reported_matches_sql(q, 5), edges)) == 0

    def test_transient_match_counted(self):
        """A match that expires later is still *reported* once."""
        q = two_path()
        edges = edges_df(
            [
                (0, 1, 10, 20, "a", "b", None),
                (1, 4, 20, 30, "b", "c", None),
                (2, 99, 40, 50, "a", "b", None),  # long after expiry
            ]
        )
        assert len(run(reported_matches_sql(q, 6), edges)) == 1

    def test_full_order_on_triangle(self):
        q = QueryGraph(
            {0: "a", 1: "a", 2: "a"},
            [(0, 1), (1, 2), (2, 0)],
            full_order_from_sequence([0, 1, 2]),
        )
        edges = edges_df(
            [
                (0, 1, 10, 11, "a", "a", None),
                (1, 2, 11, 12, "a", "a", None),
                (2, 3, 12, 10, "a", "a", None),
            ]
        )
        out = run(reported_matches_sql(q, 10), edges)
        assert len(out) == 1  # only the chronological rotation
