"""Unit tests for the query-graph model (Definitions 3, 6, 7, 8)."""
import pytest

from repro.core.query import Decomposition, QueryGraph, full_order_from_sequence

from .util import paper_query


def path_query(n: int, order=()):
    """A directed path a0→a1→…→an with distinct labels."""
    vlabels = {i: f"l{i}" for i in range(n + 1)}
    edges = [(i, i + 1) for i in range(n)]
    return QueryGraph(vlabels, edges, order)


class TestConstruction:
    def test_basic(self):
        q = path_query(3)
        assert q.n_edges == 3
        assert q.vertices == frozenset(range(4))

    def test_unlabelled_vertex_rejected(self):
        with pytest.raises(ValueError, match="unlabelled"):
            QueryGraph({0: "a"}, [(0, 1)])

    def test_duplicate_edge_rejected(self):
        with pytest.raises(ValueError, match="duplicate"):
            QueryGraph({0: "a", 1: "b"}, [(0, 1), (0, 1)])

    def test_parallel_labelled_edges_allowed(self):
        q = QueryGraph({0: "a", 1: "b"}, [(0, 1, "x"), (0, 1, "y")])
        assert q.n_edges == 2

    def test_disconnected_rejected(self):
        with pytest.raises(ValueError, match="connected"):
            QueryGraph(
                {0: "a", 1: "b", 2: "c", 3: "d"}, [(0, 1), (2, 3)]
            )

    def test_cycle_in_order_rejected(self):
        with pytest.raises(ValueError, match="cycle"):
            path_query(2, order=[(0, 1), (1, 0)])

    def test_order_out_of_range_rejected(self):
        with pytest.raises(ValueError, match="unknown edge"):
            path_query(2, order=[(0, 7)])


class TestOrderClosure:
    def test_transitive_closure(self):
        q = path_query(3, order=[(0, 1), (1, 2)])
        assert q.precedes(0, 2)
        assert q.precedes(0, 1) and q.precedes(1, 2)
        assert not q.precedes(2, 0)

    def test_full_order_helper(self):
        pairs = full_order_from_sequence([2, 0, 1])
        q = path_query(3, order=pairs)
        assert q.precedes(2, 0) and q.precedes(0, 1) and q.precedes(2, 1)

    def test_preq(self):
        q = path_query(3, order=[(0, 1), (1, 2)])
        assert q.preq(2) == frozenset({0, 1, 2})
        assert q.preq(1) == frozenset({0, 1})
        assert q.preq(0) == frozenset({0})

    def test_paper_preq(self):
        q = paper_query()
        # Preq(ε1) = {ε3, ε1} → eids {2, 0}; Preq(ε4) = {ε6, ε5, ε4}
        assert q.preq(0) == frozenset({2, 0})
        assert q.preq(3) == frozenset({5, 4, 3})


class TestSequences:
    def test_prefix_connected(self):
        q = path_query(3)
        assert q.is_prefix_connected([0, 1, 2])
        assert not q.is_prefix_connected([0, 2, 1])

    def test_timing_sequence_detection(self):
        q = path_query(3, order=[(0, 1), (1, 2)])
        assert q.is_timing_sequence([0, 1, 2])
        assert not q.is_timing_sequence([1, 0, 2])
        assert q.is_tc_query()
        assert q.timing_sequence() == [0, 1, 2]

    def test_not_tc_without_order(self):
        q = path_query(3)  # empty ≺: no 3-edge chain exists
        assert not q.is_tc_query()
        assert q.timing_sequence() is None

    def test_subquery_timing_sequence(self):
        q = paper_query()
        # {ε6, ε5, ε4} (eids 5,4,3) is a TC-subquery (§III-A)
        assert q.is_tc_query([5, 4, 3])
        assert q.timing_sequence([5, 4, 3]) == [5, 4, 3]
        # the whole running example is not a TC-query
        assert not q.is_tc_query()

    def test_duplicate_in_sequence_rejected(self):
        q = path_query(3, order=[(0, 1), (1, 2)])
        assert not q.is_timing_sequence([0, 0, 1])


class TestGraphMetrics:
    def test_diameter_path(self):
        assert path_query(4).diameter() == 4  # 4 edges → 5 vertices

    def test_diameter_star(self):
        q = QueryGraph(
            {0: "c", 1: "a", 2: "a", 3: "a"}, [(0, 1), (0, 2), (0, 3)]
        )
        assert q.diameter() == 2

    def test_distinct_term_labels(self):
        q = QueryGraph(
            {0: "a", 1: "a", 2: "a"}, [(0, 1, "x"), (1, 2, "x"), (2, 0, "y")]
        )
        assert q.distinct_term_labels() == 2

    def test_edge_vertices(self):
        q = paper_query()
        assert q.edge_vertices([5, 4]) == frozenset({0, 1, 2})


class TestDecompositionValidate:
    def test_valid(self):
        q = paper_query()
        d = Decomposition(q, [[5, 4, 3], [2, 0], [1]])
        d.validate()

    def test_partition_violation(self):
        q = paper_query()
        with pytest.raises(AssertionError, match="partition"):
            Decomposition(q, [[5, 4, 3], [2, 0]]).validate()

    def test_non_timing_sequence_rejected(self):
        q = paper_query()
        with pytest.raises(AssertionError, match="timing sequence"):
            Decomposition(q, [[4, 5, 3], [2, 0], [1]]).validate()
