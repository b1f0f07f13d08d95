"""Deferred free list (§6 "Memory management" of the paper).

Eagerly reclaiming an evicted bulk of m entries would cost O(m) node
deallocations and spoil bulk eviction's O(log m) bound. The paper's fix:
the eviction loop pushes only the O(log m) *boundary* nodes onto a free
list; when an allocation later pops a node it pushes that node's
children, so reclamation is spread out at O(1) per allocation.

``NodePool`` reproduces exactly that protocol. With ``enabled=False``
(the Fig 10 ``nofl`` ablation) freed subtrees are dropped on the floor
instead, which in CPython triggers the synchronous recursive refcount
cascade — the analog of the C++ eager ``delete`` spike. The paper's
second ablation axis (mimalloc vs libc) has no CPython equivalent and is
documented as substituted in DESIGN.md.
"""
from __future__ import annotations

from typing import List

from .node import Node


class NodePool:
    """Node allocator with the paper's deferred free list."""

    def __init__(self, enabled: bool = True):
        self.enabled = enabled
        self._free: List[Node] = []

    def __len__(self) -> int:
        return len(self._free)

    def alloc(self) -> Node:
        """Return a reset node, reusing the free list when possible.

        Popping a node pushes its (stale) children, per the paper: each
        alloc does O(1) deferred-reclamation work.
        """
        if self._free:
            nd = self._free.pop()
            if nd.children:
                self._free.extend(nd.children)
            nd.times = []
            nd.vals = []
            nd.children = []
            nd.parent = None
            nd.left_spine = False
            nd.right_spine = False
            nd.agg = None
            nd.freed = False
            return nd
        return Node()

    def free(self, node: Node) -> None:
        """Retire ``node`` (children ride along lazily; see ``alloc``)."""
        node.freed = True
        node.parent = None
        node.left_spine = False
        node.right_spine = False
        if self.enabled:
            self._free.append(node)
        else:
            # nofl ablation: cut child links so CPython reclaims the
            # subtree eagerly (recursive refcount drop = eager delete).
            node.children = []
