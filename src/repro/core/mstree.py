"""Match-store tree (MS-tree, §IV) and the uncompressed (IND) store.

An MS-tree is a trie variant over the *sequential form* of partial
matches: one node per match of ``Lʲ`` storing only the j-th constituent
edge; the full match is recovered by backtracking parent pointers; all
nodes of a depth are chained in a doubly linked list (horizontal access,
§IV-C). Deletion supports §V-C's *partial removal*: unlink from the
level list and from the parent's child set while keeping the child→
parent pointer, so concurrent earlier readers can still backtrack;
*total removal* later drops the subtree (re-walking children, so
children inserted concurrently by earlier transactions are reaped too).

``INDStore`` stores every partial match as an independent full tuple —
the paper's Timing-IND strawman; reading is cheaper but space is
``Σ j·|Lʲ|`` and deletion must scan whole items.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any, Callable, Iterator


@dataclass(eq=False)
class MSNode:
    """One MS-tree node: payload + parent pointer + level-list links."""

    payload: Any
    depth: int  # 1-based; 0 is the root sentinel
    parent: "MSNode | None"
    children: set["MSNode"] = field(default_factory=set)
    prev: "MSNode | None" = None  # level doubly-linked list
    next: "MSNode | None" = None
    removed: bool = False  # partially removed (§V-C)


class _LevelList:
    """Doubly linked list with a sentinel head, as required by Def 10."""

    def __init__(self) -> None:
        self.head = MSNode(payload=None, depth=-1, parent=None)
        self.head.prev = self.head.next = self.head
        self.size = 0

    def append(self, node: MSNode) -> None:
        tail = self.head.prev
        tail.next = node
        node.prev = tail
        node.next = self.head
        self.head.prev = node
        self.size += 1

    def unlink(self, node: MSNode) -> None:
        node.prev.next = node.next
        node.next.prev = node.prev
        node.prev = node.next = None
        self.size -= 1

    def __iter__(self) -> Iterator[MSNode]:
        n = self.head.next
        while n is not self.head:
            nxt = n.next  # allow deletion of n while iterating
            yield n
            n = nxt


class MSTree:
    """MS-tree over an expansion list with ``depth`` items (Def 10)."""

    def __init__(self, n_levels: int) -> None:
        self.root = MSNode(payload=None, depth=0, parent=None)
        self.levels: list[_LevelList] = [_LevelList() for _ in range(n_levels)]
        # op-cost counters surfaced to the experiments
        self.touched_on_delete = 0

    # -- accessors ------------------------------------------------------ #
    def level_size(self, j: int) -> int:
        """|Lʲ| (1-based j)."""
        return self.levels[j - 1].size

    def node_count(self) -> int:
        return sum(lv.size for lv in self.levels)

    def iter_level(self, j: int) -> Iterator[MSNode]:
        return iter(self.levels[j - 1])

    def backtrack(self, node: MSNode) -> list[Any]:
        """Payloads along root→node — the match in sequential form."""
        out = []
        n: MSNode | None = node
        while n is not None and n.depth > 0:
            out.append(n.payload)
            n = n.parent
        out.reverse()
        return out

    def read(self, j: int) -> list[tuple[list[Any], MSNode]]:
        """Ω(Lʲ): every depth-j match (sequential form) with its node handle.

        O(|Lʲ|·j): enumerate the level list, backtrack each node (§IV-B).
        """
        return [(self.backtrack(n), n) for n in self.iter_level(j)]

    # -- mutation -------------------------------------------------------- #
    def insert(self, parent: MSNode | None, payload: Any) -> MSNode:
        """O(1) insert: add ``payload`` as a child of ``parent`` (or root)."""
        parent = parent or self.root
        node = MSNode(payload=payload, depth=parent.depth + 1, parent=parent)
        parent.children.add(node)
        self.levels[node.depth - 1].append(node)
        return node

    def partial_remove(self, node: MSNode) -> None:
        """§V-C: unlink from level list + parent's children; keep node.parent."""
        if node.removed:
            return
        node.removed = True
        self.levels[node.depth - 1].unlink(node)
        if node.parent is not None:
            node.parent.children.discard(node)
        self.touched_on_delete += 1

    def total_remove(self, node: MSNode) -> None:
        """Drop the (partially removed) node and its remaining subtree."""
        stack = [node]
        while stack:
            n = stack.pop()
            if not n.removed:
                # A child attached after the partial pass (by an earlier,
                # still-running transaction) — reap it from its level too.
                self.partial_remove(n)
            stack.extend(n.children)
            n.children = set()
            n.parent = None

    def delete_level(
        self, j: int, pred: Callable[[Any], bool]
    ) -> list[MSNode]:
        """Partially remove depth-j nodes with ``pred(payload)``; return them."""
        hit = [n for n in self.iter_level(j) if pred(n.payload)]
        for n in hit:
            self.partial_remove(n)
        return hit

    def delete_children_of(self, parents: list[MSNode]) -> list[MSNode]:
        """Cascade one level down: partially remove all children of ``parents``."""
        out: list[MSNode] = []
        for p in parents:
            for c in list(p.children):
                self.partial_remove(c)
                out.append(c)
        return out


class INDStore:
    """Independent storage: item j holds full j-tuples (Timing-IND)."""

    def __init__(self, n_levels: int) -> None:
        self.items: list[list[list[Any]]] = [[] for _ in range(n_levels)]
        self.touched_on_delete = 0

    def level_size(self, j: int) -> int:
        return len(self.items[j - 1])

    def cell_count(self) -> int:
        return sum(len(m) for item in self.items for m in item)

    def read(self, j: int) -> list[tuple[list[Any], None]]:
        return [(m, None) for m in self.items[j - 1]]

    def insert(self, parent: None, payload: Any, prefix: list[Any]) -> None:
        """Store the full tuple ``prefix + [payload]`` at level len(prefix)+1."""
        self.items[len(prefix)].append(prefix + [payload])

    def delete_matching(self, pred_by_pos: Callable[[list[Any]], bool]) -> int:
        """Delete matches satisfying ``pred``; costs a full scan of every item."""
        deleted = 0
        for j, item in enumerate(self.items):
            self.touched_on_delete += len(item)  # the scan the paper charges
            keep = [m for m in item if not pred_by_pos(m)]
            deleted += len(item) - len(keep)
            self.items[j] = keep
        return deleted
