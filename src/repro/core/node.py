"""FiBA tree node (§3.2 of the paper).

A node stores parallel ``times``/``vals`` arrays (``vals`` are *lifted*
monoid elements), a ``children`` list (empty for leaves), a parent
pointer, two spine flags, and one location-sensitive partial aggregate
``agg`` whose *kind* depends on the node's position:

* non-spine, non-root  -> up aggregate      (Π↑)
* root                 -> inner aggregate   (Π̂)
* left spine           -> left aggregate    (Π↙)
* right spine          -> right aggregate   (Π↘)

``arity`` follows the paper's convention: number of children for
internal nodes, ``len(times) + 1`` for leaves, so the arity invariant
``MIN_ARITY <= a <= 2*MIN_ARITY`` reads identically for both.
"""
from __future__ import annotations

from typing import Any, List, Optional


class Node:
    """Mutable B-tree node; all balancing logic lives in the tree."""

    __slots__ = (
        "times",
        "vals",
        "children",
        "parent",
        "left_spine",
        "right_spine",
        "agg",
        "freed",
    )

    def __init__(self) -> None:
        self.times: List[Any] = []
        self.vals: List[Any] = []
        self.children: List["Node"] = []
        self.parent: Optional["Node"] = None
        self.left_spine = False
        self.right_spine = False
        self.agg: Any = None
        self.freed = False

    def is_leaf(self) -> bool:
        return not self.children

    @property
    def arity(self) -> int:
        """Paper arity: children count (internal) or entries+1 (leaf)."""
        return len(self.children) if self.children else len(self.times) + 1

    def __repr__(self) -> str:  # pragma: no cover - debug aid
        kind = (
            "L" if self.left_spine else "R" if self.right_spine else
            "root" if self.parent is None else "."
        )
        return f"Node({self.times!r}, kind={kind}, leaf={self.is_leaf()})"
