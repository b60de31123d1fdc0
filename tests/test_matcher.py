"""Unit tests for the relational ⋈ᵀ matcher on hand-built Spark frames."""
import pandas as pd
import pytest

from repro.core.matcher import (
    EDGE_SCHEMA,
    SubQuery,
    edge_partials,
    empty_partials,
    join_partials,
    partial_columns,
)
from repro.core.query import QueryGraph

EDGE_COLS = [f.name for f in EDGE_SCHEMA.fields]


def edges_sdf(spark, rows):
    return spark.createDataFrame(pd.DataFrame(rows, columns=EDGE_COLS), EDGE_SCHEMA)


@pytest.fixture(scope="module")
def q2():
    return QueryGraph({0: "a", 1: "b", 2: "c"}, [(0, 1), (1, 2)], [(0, 1)])


class TestEdgePartials:
    def test_label_filter_and_projection(self, spark, q2):
        sdf = edges_sdf(
            spark,
            [
                (0, 1, 10, 20, "a", "b", None),
                (1, 2, 20, 30, "b", "c", None),
                (2, 3, 11, 21, "x", "y", None),
            ],
        )
        out = edge_partials(sdf, q2, 0).toPandas()
        assert list(out.columns) == partial_columns(SubQuery.of(q2, [0]))
        assert len(out) == 1
        assert out.iloc[0]["v0"] == 10 and out.iloc[0]["t0"] == 1

    def test_self_loop_data_edge_rejected(self, spark, q2):
        sdf = edges_sdf(spark, [(0, 1, 10, 10, "a", "b", None)])
        assert edge_partials(sdf, q2, 0).count() == 0

    def test_edge_label_match(self, spark):
        q = QueryGraph({0: "a", 1: "b"}, [(0, 1, "x")])
        sdf = edges_sdf(
            spark,
            [(0, 1, 10, 20, "a", "b", "x"), (1, 2, 10, 21, "a", "b", "y")],
        )
        out = edge_partials(sdf, q, 0).toPandas()
        assert list(out["e0"]) == [0]


class TestJoinPartials:
    def test_shared_vertex_join(self, spark, q2):
        sdf = edges_sdf(
            spark,
            [(0, 1, 10, 20, "a", "b", None), (1, 2, 20, 30, "b", "c", None)],
        )
        left = edge_partials(sdf, q2, 0)
        right = edge_partials(sdf, q2, 1)
        out, sub = join_partials(
            left, SubQuery.of(q2, [0]), right, SubQuery.of(q2, [1]), q2, 100
        )
        pdf = out.toPandas()
        assert sub.edges == frozenset({0, 1})
        assert len(pdf) == 1
        assert pdf.iloc[0]["mn"] == 1 and pdf.iloc[0]["mx"] == 2

    def test_timing_predicate(self, spark, q2):
        # ε1 match arrives before ε0 match → rejected when timing is on
        sdf = edges_sdf(
            spark,
            [(0, 1, 20, 30, "b", "c", None), (1, 2, 10, 20, "a", "b", None)],
        )
        left = edge_partials(sdf, q2, 0)
        right = edge_partials(sdf, q2, 1)
        with_t, _ = join_partials(
            left, SubQuery.of(q2, [0]), right, SubQuery.of(q2, [1]), q2, 100
        )
        without_t, _ = join_partials(
            left, SubQuery.of(q2, [0]), right, SubQuery.of(q2, [1]), q2, 100,
            use_timing=False,
        )
        assert with_t.count() == 0
        assert without_t.count() == 1

    def test_window_predicate(self, spark, q2):
        sdf = edges_sdf(
            spark,
            [(0, 1, 10, 20, "a", "b", None), (1, 50, 20, 30, "b", "c", None)],
        )
        left = edge_partials(sdf, q2, 0)
        right = edge_partials(sdf, q2, 1)
        tight, _ = join_partials(
            left, SubQuery.of(q2, [0]), right, SubQuery.of(q2, [1]), q2, 30
        )
        loose, _ = join_partials(
            left, SubQuery.of(q2, [0]), right, SubQuery.of(q2, [1]), q2, 100
        )
        assert tight.count() == 0 and loose.count() == 1

    def test_bijectivity_across_sides(self, spark):
        q = QueryGraph({0: "a", 1: "b", 2: "a"}, [(0, 1), (1, 2)], [(0, 1)])
        sdf = edges_sdf(
            spark,
            [(0, 1, 10, 20, "a", "b", None), (1, 2, 20, 10, "b", "a", None)],
        )
        out, _ = join_partials(
            edge_partials(sdf, q, 0), SubQuery.of(q, [0]),
            edge_partials(sdf, q, 1), SubQuery.of(q, [1]), q, 100,
        )
        assert out.count() == 0  # both query vertices would map to 10

    def test_disconnected_join_rejected(self, spark):
        q = QueryGraph({0: "a", 1: "b", 2: "c"}, [(0, 1), (1, 2)])
        sdf = edges_sdf(spark, [(0, 1, 10, 20, "a", "b", None)])
        left = edge_partials(sdf, q, 0)
        bad = SubQuery(frozenset({1}), frozenset({9, 8}))  # fabricated
        with pytest.raises(AssertionError, match="Cartesian"):
            join_partials(left, SubQuery.of(q, [0]), left, bad, q, 10)

    def test_empty_partials_schema(self, spark, q2):
        sub = SubQuery.of(q2, [0, 1])
        df = empty_partials(spark, sub)
        assert df.columns == partial_columns(sub)
        assert df.count() == 0
