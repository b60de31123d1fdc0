"""MS-tree (§IV) and IND store unit tests: structure, ops, costs, removal."""
import pytest

from repro.core.mstree import INDStore, MSTree


def build_sample():
    """The Fig 10 tree: σ1 → σ3 → {σ4, σ9} plus a second root child σ7."""
    t = MSTree(3)
    n1 = t.insert(None, "s1")
    n3 = t.insert(n1, "s3")
    n4 = t.insert(n3, "s4")
    n9 = t.insert(n3, "s9")
    n7 = t.insert(None, "s7")
    return t, n1, n3, n4, n9, n7


class TestInsertRead:
    def test_level_sizes(self):
        t, *_ = build_sample()
        assert t.level_size(1) == 2
        assert t.level_size(2) == 1
        assert t.level_size(3) == 2
        assert t.node_count() == 5

    def test_backtrack_paths(self):
        t, n1, n3, n4, n9, n7 = build_sample()
        assert t.backtrack(n4) == ["s1", "s3", "s4"]
        assert t.backtrack(n9) == ["s1", "s3", "s9"]
        assert t.backtrack(n7) == ["s7"]
        assert t.backtrack(n1) == ["s1"]

    def test_read_level(self):
        t, *_ = build_sample()
        matches = sorted(m for m, _ in t.read(3))
        assert matches == [["s1", "s3", "s4"], ["s1", "s3", "s9"]]

    def test_insert_is_o1_under_known_parent(self):
        """Insertion extends a recorded parent — no root-to-leaf walk."""
        t, n1, n3, *_ = build_sample()
        n_new = t.insert(n3, "s11")
        assert n_new.parent is n3
        assert t.level_size(3) == 3

    def test_prefix_sharing(self):
        """Both depth-3 matches share the σ1→σ3 prefix physically."""
        t, n1, n3, n4, n9, _ = build_sample()
        assert n4.parent is n3 and n9.parent is n3 and n3.parent is n1


class TestDeletion:
    def test_cascade_delete_fig10(self):
        """Deleting σ1 removes σ3, σ4, σ9 (the paper's Fig 10 walkthrough)."""
        t, n1, n3, n4, n9, n7 = build_sample()
        hits = t.delete_level(1, lambda p: p == "s1")
        assert hits == [n1]
        lvl2 = t.delete_children_of(hits)
        assert lvl2 == [n3]
        lvl3 = set(t.delete_children_of(lvl2))
        assert lvl3 == {n4, n9}
        for n in hits:
            t.total_remove(n)
        assert t.node_count() == 1  # only σ7 remains
        assert [m for m, _ in t.read(1)] == [["s7"]]

    def test_partial_removal_keeps_parent_pointer(self):
        t, n1, n3, n4, *_ = build_sample()
        t.partial_remove(n3)
        # unlinked from level list and parent's children …
        assert t.level_size(2) == 0
        assert n3 not in n1.children
        # … but an earlier reader backtracking from n4 still reaches the root
        assert t.backtrack(n4) == ["s1", "s3", "s4"]

    def test_total_remove_reaps_late_children(self):
        """A child attached after partial removal is still reaped (§V-C)."""
        t, n1, n3, n4, n9, _ = build_sample()
        t.partial_remove(n3)
        late = t.insert(n3, "s12")  # earlier transaction's insert landing late
        t.total_remove(n3)
        assert late.removed
        assert t.level_size(3) == 0

    def test_delete_cost_counter(self):
        t, n1, *_ = build_sample()
        hits = t.delete_level(1, lambda p: p == "s1")
        t.delete_children_of(t.delete_children_of(hits))
        assert t.touched_on_delete == 4  # σ1, σ3, σ4, σ9

    def test_double_partial_remove_is_idempotent(self):
        t, n1, *_ = build_sample()
        t.partial_remove(n1)
        t.partial_remove(n1)
        assert t.level_size(1) == 1
        assert t.touched_on_delete == 1


class TestINDStore:
    def test_insert_and_read(self):
        s = INDStore(3)
        s.insert(None, "a", [])
        s.insert(None, "b", ["a"])
        s.insert(None, "c", ["a", "b"])
        assert [m for m, _ in s.read(3)] == [["a", "b", "c"]]
        assert s.cell_count() == 1 + 2 + 3

    def test_space_is_uncompressed(self):
        """IND stores j cells per depth-j match; MS-tree stores 1 node."""
        t = MSTree(3)
        n1 = t.insert(None, "a")
        n2 = t.insert(n1, "b")
        for x in range(10):
            t.insert(n2, f"c{x}")
        s = INDStore(3)
        s.insert(None, "a", [])
        s.insert(None, "b", ["a"])
        for x in range(10):
            s.insert(None, f"c{x}", ["a", "b"])
        assert t.node_count() == 12
        assert s.cell_count() == 1 + 2 + 30

    def test_delete_scans_everything(self):
        s = INDStore(2)
        s.insert(None, "a", [])
        s.insert(None, "x", [])
        s.insert(None, "b", ["a"])
        deleted = s.delete_matching(lambda m: "a" in m)
        assert deleted == 2
        assert s.touched_on_delete == 3  # the full scan the paper charges
        assert [m for m, _ in s.read(1)] == [["x"]]


class TestLevelList:
    def test_iteration_order_and_unlink(self):
        t = MSTree(1)
        nodes = [t.insert(None, f"n{i}") for i in range(5)]
        assert [n.payload for n in t.iter_level(1)] == [f"n{i}" for i in range(5)]
        t.partial_remove(nodes[2])
        assert [n.payload for n in t.iter_level(1)] == ["n0", "n1", "n3", "n4"]

    def test_safe_delete_while_iterating(self):
        t = MSTree(1)
        [t.insert(None, f"n{i}") for i in range(4)]
        for n in t.iter_level(1):
            t.partial_remove(n)
        assert t.level_size(1) == 0
