"""FiBA: finger B-tree aggregator with bulk eviction and insertion.

This is the paper's core contribution (§3.2-§5). One class implements
both algorithm variants of the evaluation:

* ``nb_fiba`` (VLDB'19 baseline): ``insert``/``evict`` single ops; bulk
  operations emulated by loops (the harness does the looping).
* ``b_fiba`` (this paper): native ``bulk_evict(t)`` / ``bulk_insert(items)``.

Design notes (see DESIGN.md §2 for the full discussion):

* The four location-sensitive aggregate kinds and the O(1) ``query()``
  follow §3.2 exactly.
* ``bulk_evict`` = boundary search + prefix-erase down the boundary +
  bottom-up repair using the paper's move-batch and
  merge-with-non-sibling-neighbor operations (Figs 2, 3, 18, 19) and
  root shrinking (Figs 4, 5, 20). The boundary search descends from the
  root (worst-case O(log n), the paper's worst case) rather than
  climbing a finger; a deliberate, documented constant-factor deviation.
* ``bulk_insert`` = finger + LCA-climbing insertion-sites search (Lemma
  2's shared search), ordered interleave into leaves, and a level-by-
  level pass up that splits overflowed nodes per Claim 1. Single insert
  reuses the same pass-up with one site.
* Aggregate repair: recompute up-aggregates for the dirty closure
  (deepest first) up to the first spine/root node, then recompute the
  root's inner aggregate and walk each touched spine top-down to its
  finger. This reproduces FiBA's O(log d) out-of-order repair cost.
* Spine membership flags are rebuilt by an O(log n) walk whenever a
  structural change touches a spine or the root; amortized against the
  Ω(μ) ops between such changes.
"""
from __future__ import annotations

import bisect
from typing import Any, Iterable, List, Optional, Sequence, Set, Tuple

from .monoids import Monoid
from .node import Node
from .pool import NodePool


class FibaTree:
    """Sliding-window aggregator over a finger B-tree (the paper's ADT)."""

    def __init__(self, monoid: Monoid, min_arity: int = 4, pool_enabled: bool = True):
        if min_arity < 2:
            raise ValueError("MIN_ARITY must be >= 2")
        self.monoid = monoid
        self.min_arity = min_arity
        self.max_entries = 2 * min_arity - 1  # MAX_ARITY - 1
        self.min_entries = min_arity - 1
        self.pool = NodePool(enabled=pool_enabled)
        self.root: Node = self.pool.alloc()
        self.root.agg = monoid.identity
        self.left_finger: Node = self.root
        self.right_finger: Node = self.root
        self._left_spine: List[Node] = []
        self._right_spine: List[Node] = []

    # ------------------------------------------------------------------
    # queries
    # ------------------------------------------------------------------

    def query(self) -> Any:
        """O(1): Π↙(leftFinger) ⊗ Π̂(root) ⊗ Π↘(rightFinger)."""
        M = self.monoid
        if self.root.is_leaf():
            return self.root.agg
        return M.combine(
            M.combine(self.left_finger.agg, self.root.agg), self.right_finger.agg
        )

    def query_lowered(self) -> Any:
        return self.monoid.lower(self.query())

    def is_empty(self) -> bool:
        return self.root.is_leaf() and not self.root.times

    def oldest(self):
        """Smallest timestamp in the window, or None if empty."""
        lf = self.left_finger
        return lf.times[0] if lf.times else None

    def youngest(self):
        """Largest timestamp in the window, or None if empty."""
        rf = self.right_finger
        return rf.times[-1] if rf.times else None

    def __len__(self) -> int:
        """Entry count by full traversal — tests/debug only (O(n))."""
        n = 0
        stack = [self.root]
        while stack:
            y = stack.pop()
            n += len(y.times)
            stack.extend(y.children)
        return n

    def items(self) -> List[Tuple[Any, Any]]:
        """In-order (timestamp, lifted value) pairs — tests/debug only."""
        out: List[Tuple[Any, Any]] = []

        def rec(y: Node) -> None:
            if y.is_leaf():
                out.extend(zip(y.times, y.vals))
                return
            for i, t in enumerate(y.times):
                rec(y.children[i])
                out.append((t, y.vals[i]))
            rec(y.children[-1])

        rec(self.root)
        return out

    # ------------------------------------------------------------------
    # location-sensitive aggregates (§3.2)
    # ------------------------------------------------------------------

    def _inner_part(self, y: Node) -> Any:
        """v0 ⊗ Π↑(c1) ⊗ v1 ⊗ ... ⊗ Π↑(c_{a-2}) ⊗ v_{a-2} (time order)."""
        M = self.monoid
        acc = M.identity
        if y.is_leaf():
            for v in y.vals:
                acc = M.combine(acc, v)
            return acc
        k = len(y.times)
        for i in range(k):
            acc = M.combine(acc, y.vals[i])
            if i < k - 1:
                acc = M.combine(acc, y.children[i + 1].agg)
        return acc

    def _up_val(self, y: Node) -> Any:
        """Π↑(y): all children and own values, interleaved in time order."""
        M = self.monoid
        if y.is_leaf():
            acc = M.identity
            for v in y.vals:
                acc = M.combine(acc, v)
            return acc
        acc = y.children[0].agg
        for i in range(len(y.times)):
            acc = M.combine(acc, y.vals[i])
            acc = M.combine(acc, y.children[i + 1].agg)
        return acc

    def _recompute_agg(self, y: Node) -> None:
        """Recompute ``y.agg`` in the kind its current position demands."""
        M = self.monoid
        if y is self.root:
            y.agg = self._inner_part(y)
        elif y.left_spine:
            parent_part = M.identity if y.parent is self.root else y.parent.agg
            acc = self._inner_part(y)
            if not y.is_leaf():
                acc = M.combine(acc, y.children[-1].agg)
            y.agg = M.combine(acc, parent_part)
        elif y.right_spine:
            parent_part = M.identity if y.parent is self.root else y.parent.agg
            acc = self._inner_part(y)
            if not y.is_leaf():
                acc = M.combine(y.children[0].agg, acc)
            y.agg = M.combine(parent_part, acc)
        else:
            y.agg = self._up_val(y)

    # ------------------------------------------------------------------
    # spine bookkeeping
    # ------------------------------------------------------------------

    def _rebuild_spines(self) -> None:
        """Re-derive spine flags, spine lists, and both fingers (O(log n))."""
        for nd in self._left_spine:
            nd.left_spine = False
        for nd in self._right_spine:
            nd.right_spine = False
        self._left_spine = []
        self._right_spine = []
        r = self.root
        r.left_spine = r.right_spine = False
        r.parent = None
        if r.is_leaf():
            self.left_finger = self.right_finger = r
            return
        y = r.children[0]
        while True:
            y.left_spine = True
            self._left_spine.append(y)
            if y.is_leaf():
                break
            y = y.children[0]
        self.left_finger = y
        y = r.children[-1]
        while True:
            y.right_spine = True
            self._right_spine.append(y)
            if y.is_leaf():
                break
            y = y.children[-1]
        self.right_finger = y

    def _depth(self, y: Node) -> int:
        d = 0
        while y is not self.root:
            y = y.parent
            d += 1
        return d

    def _repair_aggs(self, dirty: Iterable[Node]) -> None:
        """Repair aggregate invariants after structural/value changes.

        Pass up: recompute up-aggregates for the closure of dirty nodes
        up to (excluding) the first spine/root ancestor, deepest first.
        Pass down: recompute the root's inner aggregate if reached, and
        walk each touched spine from its highest dirty node down to the
        finger (left/right aggregates depend on the parent's aggregate).
        """
        root = self.root
        chain: Set[Node] = set()
        spine_hits: List[Node] = []
        root_dirty = False
        for y in dirty:
            if y.freed:
                continue
            node = y
            while True:
                if node is root:
                    root_dirty = True
                    break
                if node.left_spine or node.right_spine:
                    spine_hits.append(node)
                    break
                if node in chain:
                    break
                chain.add(node)
                node = node.parent
        for y in sorted(chain, key=self._depth, reverse=True):
            y.agg = self._up_val(y)
        if root_dirty:
            root.agg = self._inner_part(root)
        for is_left in (True, False):
            hits = [h for h in spine_hits if (h.left_spine if is_left else h.right_spine)]
            if not hits:
                continue
            y = min(hits, key=self._depth)
            while True:
                self._recompute_agg(y)
                if y.is_leaf():
                    break
                y = y.children[0] if is_left else y.children[-1]

    # ------------------------------------------------------------------
    # search (finger search + LCA climbing)
    # ------------------------------------------------------------------

    def _descend(self, node: Node, t) -> Tuple[Node, int, bool]:
        """Standard B-tree descent from ``node``; (node, index, exact)."""
        while True:
            ts = node.times
            j = bisect.bisect_left(ts, t)
            if j < len(ts) and ts[j] == t:
                return node, j, True
            if node.is_leaf():
                return node, j, False
            node = node.children[j]

    def _climb_locate(self, start: Node, t) -> Tuple[Node, int, bool]:
        """Finger search: climb from ``start`` to the lowest ancestor that
        provably brackets ``t``, then descend. O(log d) from a finger.
        """
        y = start
        while True:
            p = y.parent
            if p is None:
                return self._descend(y, t)
            ts = p.times
            j = bisect.bisect_left(ts, t)
            if j < len(ts) and ts[j] == t:
                return p, j, True
            if 0 < j < len(ts):
                return self._descend(p.children[j], t)
            # On a spine the missing outer bound is ±infinity, so the
            # bracket is decided locally; otherwise keep climbing.
            if j == len(ts) and p.right_spine:
                return self._descend(p.children[-1], t)
            if j == 0 and p.left_spine:
                return self._descend(p.children[0], t)
            y = p

    # ------------------------------------------------------------------
    # single insert / evict (the nb_fiba operations, VLDB'19)
    # ------------------------------------------------------------------

    def insert(self, t, v) -> None:
        """Insert one (timestamp, raw value); combines on collision."""
        M = self.monoid
        lifted = M.lift(v)
        node, j, exact = self._climb_locate(self.right_finger, t)
        if exact:
            node.vals[j] = M.combine(node.vals[j], lifted)
            self._repair_aggs((node,))
            return
        node.times.insert(j, t)
        node.vals.insert(j, lifted)
        self._pass_up([node], {node})

    def evict(self) -> None:
        """Evict the single oldest entry (no-op on an empty window)."""
        leaf = self.left_finger
        if not leaf.times:
            return
        leaf.times.pop(0)
        leaf.vals.pop(0)
        dirty: Set[Node] = {leaf}
        touched_spine = False
        root_changed = False
        y = leaf
        while y is not self.root and len(y.times) < self.min_entries:
            p = y.parent
            sib = p.children[1]
            if len(sib.times) > self.min_entries:
                # Borrow one entry through the parent (move with k=1).
                y.times.append(p.times[0])
                y.vals.append(p.vals[0])
                if not y.is_leaf():
                    c = sib.children.pop(0)
                    c.parent = y
                    y.children.append(c)
                p.times[0] = sib.times.pop(0)
                p.vals[0] = sib.vals.pop(0)
                dirty.update((sib, p))
                break
            # Merge y into its right sibling (node-into-neighbor direction).
            sib.times[:0] = y.times + [p.times[0]]
            sib.vals[:0] = y.vals + [p.vals[0]]
            if not y.is_leaf():
                for c in y.children:
                    c.parent = sib
                sib.children[:0] = y.children
            p.times.pop(0)
            p.vals.pop(0)
            p.children.pop(0)
            y.children = []  # moved into sib; keep them off the free list
            self.pool.free(y)
            dirty.discard(y)
            dirty.update((sib, p))
            touched_spine = True
            y = p
        while not self.root.is_leaf() and not self.root.times:
            old = self.root
            self.root = old.children[0]
            self.root.parent = None
            old.children = []  # the new root stays alive
            self.pool.free(old)
            dirty.discard(old)
            touched_spine = True
            root_changed = True
        if touched_spine:
            self._rebuild_spines()
        if root_changed:
            # Spine aggregates chain from the root downward; a root change
            # invalidates both spines from their tops.
            dirty.add(self.root)
            if self._left_spine:
                dirty.add(self._left_spine[0])
            if self._right_spine:
                dirty.add(self._right_spine[0])
        self._repair_aggs(dirty)

    # ------------------------------------------------------------------
    # pass up: interleave & split (§5 Step 2), shared by insert paths
    # ------------------------------------------------------------------

    def _chunk_sizes(self, p: int) -> List[int]:
        """Claim 1: write arity p > 2μ as (μ+1)+...+(μ+1)+b, μ <= b <= 2μ."""
        mu = self.min_arity
        sizes: List[int] = []
        rem = p
        while rem > 2 * mu:
            sizes.append(mu + 1)
            rem -= mu + 1
        sizes.append(rem)
        return sizes

    def _bulk_split(self, nd: Node) -> List[Tuple[Any, Any, Node]]:
        """Split an overflowed node into invariant-respecting chunks.

        ``nd`` keeps the first chunk in place; returns the promoted
        separators paired with the freshly allocated right chunks, in
        time order, ready to splice into the parent after ``nd``.
        """
        sizes = self._chunk_sizes(nd.arity)
        E_t, E_v, C = nd.times, nd.vals, nd.children
        promos: List[Tuple[Any, Any, Node]] = []
        off_e = sizes[0] - 1
        off_c = sizes[0]
        first = sizes[0]
        new_nodes: List[Node] = []
        for b in sizes[1:]:
            sep_t, sep_v = E_t[off_e], E_v[off_e]
            off_e += 1
            z = self.pool.alloc()
            z.times = E_t[off_e : off_e + b - 1]
            z.vals = E_v[off_e : off_e + b - 1]
            off_e += b - 1
            if C:
                z.children = C[off_c : off_c + b]
                for c in z.children:
                    c.parent = z
                off_c += b
            promos.append((sep_t, sep_v, z))
            new_nodes.append(z)
        nd.times = E_t[: first - 1]
        nd.vals = E_v[: first - 1]
        if C:
            nd.children = C[:first]
        return promos

    def _pass_up(self, level_nodes: List[Node], dirty: Set[Node]) -> None:
        """Split overflowed nodes level by level, then repair aggregates."""
        touched_spine = False
        current = level_nodes
        while current:
            parents: List[Node] = []
            seen: Set[Node] = set()
            for nd in current:
                if len(nd.times) <= self.max_entries:
                    continue
                if nd.left_spine or nd.right_spine or nd is self.root:
                    touched_spine = True
                promos = self._bulk_split(nd)
                p = nd.parent
                if p is None:
                    p = self.pool.alloc()
                    p.children = [nd]
                    nd.parent = p
                    self.root = p
                    touched_spine = True
                idx = p.children.index(nd)
                for off, (st, sv, z) in enumerate(promos):
                    p.times.insert(idx + off, st)
                    p.vals.insert(idx + off, sv)
                    p.children.insert(idx + 1 + off, z)
                    z.parent = p
                    dirty.add(z)
                dirty.add(p)
                if p not in seen:
                    seen.add(p)
                    parents.append(p)
            current = parents
        if touched_spine:
            self._rebuild_spines()
        self._repair_aggs(dirty)

    # ------------------------------------------------------------------
    # bulk insertion (§5)
    # ------------------------------------------------------------------

    def bulk_insert(self, items: Iterable[Tuple[Any, Any]]) -> None:
        """Insert a bulk of (timestamp, raw value) pairs.

        The bulk need not be sorted or duplicate-free: it is sorted and
        same-timestamp values pre-combined in arrival order (the paper
        assumes a sorted iterator; sorting here keeps the ADT forgiving
        while preserving the collision semantics v_pre ⊗ v_in).
        """
        M = self.monoid
        raw = sorted(items, key=lambda p: p[0])
        if not raw:
            return
        batch: List[Tuple[Any, Any]] = []
        for t, v in raw:
            lv = M.lift(v)
            if batch and batch[-1][0] == t:
                batch[-1] = (t, M.combine(batch[-1][1], lv))
            else:
                batch.append((t, lv))
        dirty: Set[Node] = set()
        # Step 1: insertion-sites search (finger + LCA climbing, Lemma 2),
        # grouping consecutive entries destined for the same leaf.
        groups: List[Tuple[Node, List[Tuple[Any, Any]]]] = []
        cur_leaf: Optional[Node] = None
        pos: Node = self.right_finger
        for t, lv in batch:
            node, j, exact = self._climb_locate(pos, t)
            pos = node
            if exact:
                node.vals[j] = M.combine(node.vals[j], lv)
                dirty.add(node)
                continue
            if node is cur_leaf:
                groups[-1][1].append((t, lv))
            else:
                groups.append((node, [(t, lv)]))
                cur_leaf = node
        # Step 2 part 1: ordered interleave into each target leaf
        # (merge-sort merge; collisions combine window value first).
        touched: List[Node] = []
        for leaf, its in groups:
            self._interleave_into_leaf(leaf, its)
            dirty.add(leaf)
            touched.append(leaf)
        # Step 2 part 2 + Step 3: pass up (interleave&split) + repair.
        self._pass_up(touched, dirty)

    def _interleave_into_leaf(self, leaf: Node, its: Sequence[Tuple[Any, Any]]) -> None:
        M = self.monoid
        ot, ov = leaf.times, leaf.vals
        nt: List[Any] = []
        nv: List[Any] = []
        i = j = 0
        while i < len(ot) and j < len(its):
            t_new, v_new = its[j]
            if ot[i] < t_new:
                nt.append(ot[i])
                nv.append(ov[i])
                i += 1
            elif ot[i] > t_new:
                nt.append(t_new)
                nv.append(v_new)
                j += 1
            else:
                nt.append(ot[i])
                nv.append(M.combine(ov[i], v_new))
                i += 1
                j += 1
        nt.extend(ot[i:])
        nv.extend(ov[i:])
        for t_new, v_new in its[j:]:
            nt.append(t_new)
            nv.append(v_new)
        leaf.times = nt
        leaf.vals = nv

    # ------------------------------------------------------------------
    # bulk eviction (§4)
    # ------------------------------------------------------------------

    def bulk_evict(self, t) -> None:
        """Evict every entry with timestamp <= t."""
        root = self.root
        if root.is_leaf():
            i = bisect.bisect_right(root.times, t)
            if i:
                del root.times[:i]
                del root.vals[:i]
                self._repair_aggs((root,))
            return
        youngest = self.youngest()
        if t >= youngest:
            # Everything goes: O(1) reset, old tree onto the free list.
            self.pool.free(self.root)
            self.root = self.pool.alloc()
            self.root.agg = self.monoid.identity
            self._left_spine = []
            self._right_spine = []
            self.left_finger = self.right_finger = self.root
            return
        oldest = self.oldest()
        if t < oldest:
            return
        # Finger fast path (§4 Step 1 starts at a finger): when the
        # boundary falls inside the left-finger leaf and leaves it
        # arity-valid, the eviction is local to the finger — O(m)
        # local work + O(1) aggregate repair, the common case for the
        # small bulks that dominate real streams (Figure 15).
        lf = self.left_finger
        i = bisect.bisect_right(lf.times, t)
        if i < len(lf.times) and len(lf.times) - i >= self.min_entries:
            del lf.times[:i]
            del lf.vals[:i]
            self._repair_aggs((lf,))
            return
        # Step 1+2a: boundary descent with local prefix-eviction.
        path: List[Node] = []
        node = root
        while True:
            ts = node.times
            i = bisect.bisect_right(ts, t)
            exact = i > 0 and ts[i - 1] == t
            if i:
                del node.times[:i]
                del node.vals[:i]
                if node.children:
                    for c in node.children[:i]:
                        self.pool.free(c)
                    del node.children[:i]
            path.append(node)
            if exact or node.is_leaf():
                break
            node = node.children[0]
        dirty: Set[Node] = set(path)
        self._repair_boundary(path, dirty)
        while not self.root.is_leaf() and len(self.root.children) == 1:
            old = self.root
            self.root = old.children[0]
            self.root.parent = None
            old.children = []  # keep the new root off the free-list ride
            self.pool.free(old)
            dirty.discard(old)
        self._rebuild_spines()
        # Spine aggregates chain from the root downward and the boundary
        # may have re-rooted or re-flagged whole spines: repair both
        # spines from their tops (O(log n), the documented worst case).
        dirty.add(self.root)
        if self._left_spine:
            dirty.add(self._left_spine[0])
        if self._right_spine:
            dirty.add(self._right_spine[0])
        self._repair_aggs(dirty)

    def _repair_boundary(self, path: List[Node], dirty: Set[Node]) -> None:
        """Pass up the boundary repairing arity underflow (§4 Step 2).

        Processes boundary levels bottom-up. An underfull node's only
        eligible neighbor is to its right and may not be a sibling; the
        least common ancestor is the lowest boundary ancestor with
        arity >= 2 (intermediate arity-1 chain nodes are eliminated by
        merges, exactly as in the paper's Figure 3/19).
        """
        mu = self.min_arity
        eliminated: Set[Node] = set()
        for k in range(len(path) - 1, 0, -1):
            nodek = path[k]
            if nodek in eliminated:
                continue
            if nodek.arity >= mu:
                continue
            # Climb to the least common ancestor with a right neighbor.
            anc = nodek.parent
            chain: List[Node] = [nodek]
            while anc is not None and len(anc.children) < 2:
                chain.append(anc)
                anc = anc.parent
            if anc is None:
                # The whole boundary above is an arity-1 chain: nodek
                # becomes the root via the shrink loop (Figs 4/5/20).
                continue
            j = k - len(chain)  # anc == path[j]
            nb = anc.children[1]
            for _ in range(k - j - 1):
                nb = nb.children[0]
            deficit = mu - nodek.arity
            surplus = nb.arity - mu
            if deficit <= surplus:
                self._move_batch(nodek, nb, anc, deficit)
                dirty.update((nodek, nb, anc))
            else:
                self._merge_non_sibling(nodek, nb, anc)
                for ch in chain:
                    eliminated.add(ch)
                    dirty.discard(ch)
                    ch.children = []  # chain links are freed individually
                    self.pool.free(ch)
                dirty.update((nb, anc))

    def _move_batch(self, node: Node, neighbor: Node, ancestor: Node, k: int) -> None:
        """Move k entries/children from neighbor to node through the
        separating entry in their least common ancestor (Figs 2/18)."""
        node.times.append(ancestor.times[0])
        node.vals.append(ancestor.vals[0])
        node.times.extend(neighbor.times[: k - 1])
        node.vals.extend(neighbor.vals[: k - 1])
        if node.children:
            moved = neighbor.children[:k]
            for c in moved:
                c.parent = node
            node.children.extend(moved)
            del neighbor.children[:k]
        ancestor.times[0] = neighbor.times[k - 1]
        ancestor.vals[0] = neighbor.vals[k - 1]
        del neighbor.times[:k]
        del neighbor.vals[:k]

    def _merge_non_sibling(self, node: Node, neighbor: Node, ancestor: Node) -> None:
        """Merge node (and the separator rotated down from the ancestor)
        into the front of its possibly-non-sibling neighbor (Figs 3/19).
        The arity-1 chain between node and ancestor is eliminated by the
        caller; the ancestor drops its first entry and child."""
        if node.children:
            for c in node.children:
                c.parent = neighbor
            neighbor.children[:0] = node.children
            node.children = []  # moved; keep them off the free list
        neighbor.times[:0] = node.times + [ancestor.times[0]]
        neighbor.vals[:0] = node.vals + [ancestor.vals[0]]
        ancestor.times.pop(0)
        ancestor.vals.pop(0)
        ancestor.children.pop(0)
