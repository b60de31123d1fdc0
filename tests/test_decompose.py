"""§VI decomposition: TCsub (Alg 5), greedy cover (Alg 6), join order, cost."""
import random

import pytest

from repro.core.query import QueryGraph
from repro.datagen.queries import generate_query
from repro.datagen.streams import netflow_stream, social_stream, wikitalk_stream
from repro.decompose import (
    decompose,
    greedy_decomposition,
    order_parts,
    random_decomposition,
    tcsub,
)
from repro.decompose.cost import expected_join_ops, query_cost
from repro.decompose.joinorder import joint_number

from .util import paper_query

STREAMS = {
    "netflow": netflow_stream(600, seed=0),
    "wikitalk": wikitalk_stream(600, seed=1),
    "social": social_stream(600, seed=2),
}


class TestTCSub:
    def test_paper_example_exactly_ten(self):
        q = paper_query()
        subs = tcsub(q)
        # paper (§VI-B): {ε6,ε5,ε4}, {ε3,ε1}, {ε5,ε4}, {ε6,ε5} + 6 singletons
        expected = {
            frozenset({5, 4, 3}),
            frozenset({2, 0}),
            frozenset({4, 3}),
            frozenset({5, 4}),
            *(frozenset({e}) for e in range(6)),
        }
        assert set(subs) == expected

    def test_every_sequence_is_timing_sequence(self):
        q = paper_query()
        for eset, seq in tcsub(q).items():
            assert frozenset(seq) == eset
            assert q.is_timing_sequence(seq)

    def test_singletons_always_present(self):
        q = paper_query()
        subs = tcsub(q)
        for e in range(q.n_edges):
            assert frozenset({e}) in subs

    def test_prefix_closure(self):
        """Every prefix of a returned timing sequence is itself in TCsub."""
        q = paper_query()
        subs = tcsub(q)
        for seq in subs.values():
            for j in range(1, len(seq)):
                assert frozenset(seq[:j]) in subs

    @pytest.mark.parametrize("dataset", sorted(STREAMS))
    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_random_queries(self, dataset, seed):
        gq = generate_query(STREAMS[dataset], 6, order_mode="random", seed=seed)
        for eset, seq in tcsub(gq.query).items():
            assert gq.query.is_timing_sequence(seq)

    def test_state_cap(self):
        """A capped enumeration still returns all singletons."""
        q = paper_query()
        subs = tcsub(q, max_states=6)
        for e in range(q.n_edges):
            assert frozenset({e}) in subs


class TestGreedy:
    def test_paper_decomposition(self):
        q = paper_query()
        parts = greedy_decomposition(q)
        assert sorted(map(sorted, parts)) == [[0, 2], [1], [3, 4, 5]]

    @pytest.mark.parametrize("dataset", sorted(STREAMS))
    @pytest.mark.parametrize("seed", range(4))
    @pytest.mark.parametrize("mode", ["random", "full", "empty"])
    def test_valid_decomposition(self, dataset, seed, mode):
        gq = generate_query(STREAMS[dataset], 6, order_mode=mode, seed=seed)
        d = decompose(gq.query)
        d.validate()

    def test_empty_order_gives_singletons(self):
        gq = generate_query(STREAMS["wikitalk"], 5, order_mode="empty", seed=1)
        d = decompose(gq.query)
        assert d.k == gq.query.n_edges

    @pytest.mark.parametrize("seed", range(5))
    def test_greedy_not_larger_than_random(self, seed):
        gq = generate_query(STREAMS["netflow"], 8, order_mode="random", seed=seed)
        g = greedy_decomposition(gq.query)
        r = random_decomposition(gq.query, random.Random(seed))
        assert len(g) <= len(r)

    @pytest.mark.parametrize("seed", range(5))
    def test_random_decomposition_valid(self, seed):
        gq = generate_query(STREAMS["social"], 6, order_mode="random", seed=seed)
        d = decompose(gq.query, strategy="random", rng=random.Random(seed))
        d.validate()


class TestJoinOrder:
    def test_paper_joint_numbers(self):
        q = paper_query()
        assert joint_number(q, [5, 4, 3], [2, 0]) == 2  # shared {A, D}
        assert joint_number(q, [5, 4, 3], [1]) == 2  # shared {B, C}
        assert joint_number(q, [2, 0], [1]) == 2  # ε1≺ε2 and ε3≺ε2 (closure)

    def test_timing_pairs_counted(self):
        q = QueryGraph(
            {0: "a", 1: "b", 2: "c"},
            [(0, 1), (1, 2), (2, 0)],
            [(0, 1), (0, 2)],
        )
        assert joint_number(q, [0], [1]) == 1 + 1  # one shared vertex + 0≺1
        assert joint_number(q, [1], [2]) == 1  # shared vertex only

    def test_prefix_connected_output(self):
        q = paper_query()
        parts = greedy_decomposition(q)
        ordered = order_parts(q, parts)
        seen = set(q.edge_vertices(ordered[0]))
        for p in ordered[1:]:
            assert q.edge_vertices(p) & seen
            seen |= q.edge_vertices(p)

    @pytest.mark.parametrize("seed", range(4))
    def test_random_order_prefix_connected(self, seed):
        gq = generate_query(STREAMS["wikitalk"], 7, order_mode="random", seed=seed)
        parts = greedy_decomposition(gq.query)
        ordered = order_parts(
            gq.query, parts, rng=random.Random(seed), randomize=True
        )
        assert sorted(map(tuple, map(sorted, ordered))) == sorted(
            map(tuple, map(sorted, parts))
        )
        seen = set(gq.query.edge_vertices(ordered[0]))
        for p in ordered[1:]:
            assert gq.query.edge_vertices(p) & seen
            seen |= gq.query.edge_vertices(p)


class TestCostModel:
    def test_theorem7_formula(self):
        # N = (1/d)(|E|−1 + k(k−1)/2)
        assert expected_join_ops(6, 3, 2) == (6 - 1 + 3) / 2
        assert expected_join_ops(12, 1, 4) == 11 / 4
        assert expected_join_ops(12, 12, 4) == (11 + 66) / 4

    def test_monotone_in_k(self):
        vals = [expected_join_ops(10, k, 3) for k in range(1, 11)]
        assert vals == sorted(vals)
        assert len(set(vals)) == len(vals)

    def test_query_cost_uses_term_labels(self):
        q = paper_query()
        assert query_cost(q, 3) == expected_join_ops(6, 3, q.distinct_term_labels())

    def test_invalid_args(self):
        with pytest.raises(ValueError):
            expected_join_ops(6, 0, 2)
        with pytest.raises(ValueError):
            expected_join_ops(6, 7, 2)
        with pytest.raises(ValueError):
            expected_join_ops(6, 2, 0)
