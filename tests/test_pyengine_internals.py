"""White-box tests of the per-edge engine: the paper's lemmas/theorems.

Covers Lemma 1 (discardable-edge filtering via prerequisite subqueries),
Theorem 2 (an incoming edge updates exactly one item per matched query
edge), Theorem 3 (filtering cost linear in |Lⁱ⁻¹|), and Algorithm 2's
cascading deletion through the L₀ list.
"""
import pytest

from repro.core.pyengine import Edge, PyTimingEngine
from repro.core.query import QueryGraph, full_order_from_sequence

from .util import paper_query


def mk_edge(eid, ts, src, dst, sl, dl, el=None):
    return Edge(eid, ts, src, dst, sl, dl, el)


def chain_query(labels="abc", order_full=True):
    """Path query l0→l1→l2 with ε0≺ε1 (a 2-edge TC-query)."""
    vl = {i: labels[i] for i in range(len(labels))}
    edges = [(i, i + 1) for i in range(len(labels) - 1)]
    order = full_order_from_sequence(range(len(edges))) if order_full else []
    return QueryGraph(vl, edges, order)


class TestDiscardableFiltering:
    def test_lemma1_edge_without_prerequisite_is_dropped(self):
        """ε0≺ε1: an ε1-matching edge with no prior ε0 match stores nothing."""
        q = chain_query()
        eng = PyTimingEngine(q, 100)
        # matches ε1 (b→c) but no ε0 (a→b) arrived yet → discardable
        out = eng.run_ins(mk_edge(0, 1, 10, 20, "b", "c"))
        assert out == []
        assert eng.space_nodes() == 0

    def test_non_discardable_edge_is_stored(self):
        q = chain_query()
        eng = PyTimingEngine(q, 100)
        eng.run_ins(mk_edge(0, 1, 5, 10, "a", "b"))
        assert eng.space_nodes() == 1
        out = eng.run_ins(mk_edge(1, 2, 10, 20, "b", "c"))
        assert len(out) == 1
        assert eng.space_nodes() == 2  # the ε0 match + the complete match

    def test_paper_sigma6_example(self):
        """§III-A: σ6 matches ε1 but no ε3 arrived before it → discarded."""
        q = paper_query()
        eng = PyTimingEngine(q, 1000)
        # ε1 = eid 0 = E→A (labels e→a); Preq(ε1) = {ε3, ε1}
        out = eng.run_ins(mk_edge(6, 6, 100, 101, "e", "a"))
        assert out == []
        part_of_e1 = next(i for i, p in enumerate(eng.parts) if 0 in p)
        assert eng.part_stores[part_of_e1].node_count() == 0


class TestTheorem2SingleItemUpdate:
    def test_only_matched_item_grows(self):
        q = chain_query("abcd")  # ε0≺ε1≺ε2
        eng = PyTimingEngine(q, 100)
        eng.run_ins(mk_edge(0, 1, 1, 2, "a", "b"))
        sizes = [eng.part_stores[0].level_size(j) for j in (1, 2, 3)]
        assert sizes == [1, 0, 0]
        eng.run_ins(mk_edge(1, 2, 2, 3, "b", "c"))
        sizes = [eng.part_stores[0].level_size(j) for j in (1, 2, 3)]
        assert sizes == [1, 1, 0]
        # an edge matching ε1 again only ever touches L², never L¹/L³
        eng.run_ins(mk_edge(2, 3, 2, 30, "b", "c"))
        sizes = [eng.part_stores[0].level_size(j) for j in (1, 2, 3)]
        assert sizes == [1, 2, 0]


class TestTheorem3Cost:
    def test_filter_cost_linear_in_prev_item(self):
        q = chain_query()
        eng = PyTimingEngine(q, 1000)
        for i in range(7):  # 7 matches of ε0 sharing dst vertex 10… no, distinct
            eng.run_ins(mk_edge(i, i + 1, 100 + i, 10, "a", "b"))
        eng.run_ins(mk_edge(99, 50, 10, 11, "b", "c"))
        read_ops = [
            op
            for tx in eng.oplog
            for op in tx.ops
            if op.kind == "READ" and op.item == ("P", 0, 1)
        ]
        assert read_ops[-1].cost == 7  # |L¹| partial matches scanned


class TestDeletionCascade:
    def test_del_removes_dependent_l0_matches(self):
        # two disconnected-in-time parts: ε0 (a→b), ε1 (b→c), no order
        q = QueryGraph({0: "a", 1: "b", 2: "c"}, [(0, 1), (1, 2)], [])
        eng = PyTimingEngine(q, 10)
        assert eng.k == 2
        r1 = eng.run_ins(mk_edge(0, 1, 1, 2, "a", "b"))
        r2 = eng.run_ins(mk_edge(1, 3, 2, 3, "b", "c"))
        assert len(r1) + len(r2) == 1
        assert eng.l0_store.level_size(2) == 1
        eng.run_del(mk_edge(0, 1, 1, 2, "a", "b"))
        assert eng.l0_store.level_size(2) == 0
        # the ε1 match survives — only matches containing σ die
        total_part = sum(t.node_count() for t in eng.part_stores)
        assert total_part == 1

    def test_del_cost_linear_in_expired(self):
        q = chain_query()
        eng = PyTimingEngine(q, 1000)
        eng.run_ins(mk_edge(0, 1, 1, 2, "a", "b"))
        for i in range(5):
            eng.run_ins(mk_edge(1 + i, 2 + i, 2, 10 + i, "b", "c"))
        tree = eng.part_stores[0]
        before = tree.touched_on_delete
        eng.run_del(mk_edge(0, 1, 1, 2, "a", "b"))
        # 1 depth-1 node + its 5 children — exactly the expired matches
        assert tree.touched_on_delete - before == 6

    def test_ind_del_scans_whole_items(self):
        q = chain_query()
        eng = PyTimingEngine(q, 1000, use_mstree=False)
        eng.run_ins(mk_edge(0, 1, 1, 2, "a", "b"))
        eng.run_ins(mk_edge(1, 2, 99, 98, "a", "b"))  # unrelated ε0 match
        eng.run_ins(mk_edge(2, 3, 2, 10, "b", "c"))
        store = eng.part_stores[0]
        before = store.touched_on_delete
        eng.run_del(mk_edge(0, 1, 1, 2, "a", "b"))
        # IND must scan both items fully: |L¹|=2 plus |L²|=1
        assert store.touched_on_delete - before == 3


class TestWindowSemantics:
    def test_expired_before_pops_in_order(self):
        q = chain_query()
        eng = PyTimingEngine(q, 10)
        for i in range(5):
            e = mk_edge(i, 1 + i * 3, 1 + i, 2 + i, "a", "b")
            eng.run_ins(e)
            eng.buffer.append(e)
        out = eng.expired_before(14)
        assert [e.eid for e in out] == [0, 1]  # ts 1, 4 ≤ 14 − 10
        out = eng.expired_before(25)
        assert [e.eid for e in out] == [2, 3, 4]  # ts 7, 10, 13 all ≤ 15

    def test_extension_blocked_across_window(self):
        q = chain_query()
        eng = PyTimingEngine(q, 5)
        eng.run_ins(mk_edge(0, 1, 1, 2, "a", "b"))
        # within window at ts 5, outside at ts 7
        assert len(eng.run_ins(mk_edge(1, 5, 2, 3, "b", "c"))) == 1
        assert len(eng.run_ins(mk_edge(2, 7, 2, 4, "b", "c"))) == 0
