"""Strict State Graph (SSG) approach to MCOS generation (paper §4.3).

States are nodes of a DAG whose edges run from generating state to
generated state, with:

- **Property 1**: every edge ``(p, c)`` has ``ID_c ⊂ ID_p``;
- **Property 2**: no child of a node subsumes a sibling.

The State Traversal (ST, Algorithm 1) visits the graph from its roots
(principal states, in arrival order) for every arriving frame and
*stops descending* whenever a state's intersection with the arriving
object set is empty — every descendant's intersection is a subset, so
whole subtrees are skipped.  That is the pruning that NAIVE and MFS
(which intersect *every* stored state per frame) cannot do.

Implementation notes (see DESIGN.md §5 for the mapping to the paper's
pseudocode and the ambiguities resolved):

- Traversal and state update are two phases: the traversal collects,
  per intersection value, the set of *generator* states it met
  (exactly the states whose intersection with the frame is non-empty —
  these are provably all states with non-empty intersection), then the
  update phase applies the same creation/append/marking rules as MFS
  over that generator map plus all edge maintenance.  This is
  behaviourally identical to the interleaved Algorithm 1 + CNPS and
  makes "SSG result == MFS result" an exact testable property.
- ``_add_edge`` is an idempotent Property-2-preserving insertion: a
  new child subsumed by an existing sibling is placed below that
  sibling (recursively); existing siblings subsumed by the new child
  are re-parented below it (§4.3.4 "Modifying Existing Edges").
  Applied to the new principal state over the intersection values in
  descending cardinality, it realises the CNPS selection (§4.3.5).
- Invalid states met during traversal are pruned on the spot
  (``pruneState``): removed from the graph with their children
  re-attached to their parents (or promoted to roots) so every live
  state stays reachable.
- The Result State Set is maintained lazily per §4.3.7:
  ``SR_i = revalidate(SR_{i-1}) ∪ {satisfied states visited at i}``.
- States never visited again (empty intersections forever) would
  otherwise linger; a garbage sweep every ``w`` frames bounds memory
  at amortised O(|S|/w) per frame.
"""
from __future__ import annotations

from itertools import count
from typing import Callable, Iterator

from repro.core.model import State, Window, merge_sorted_unique


class SSGNode:
    """A graph node owning one state plus adjacency and visit flag."""

    __slots__ = ("state", "objset", "children", "parents", "flag", "seq")

    def __init__(self, state: State, seq: int) -> None:
        self.state = state
        self.objset = state.objset  # denormalised: hot in traversal
        self.children: set[SSGNode] = set()
        self.parents: set[SSGNode] = set()
        self.flag = -1  # fid of the last frame that visited this node
        self.seq = seq  # creation order; roots are traversed in order

    def __repr__(self) -> str:  # pragma: no cover - debug aid
        return f"SSGNode({bin(self.objset)}, F={self.state.frames}, M={self.state.mark})"


class SSGGenerator:
    """SSG state maintenance with ST traversal and CNPS connection."""

    def __init__(
        self,
        w: int,
        d: int,
        admit: Callable[[int], bool] | None = None,
        gc_every: int | None = None,
    ) -> None:
        self.win = Window(w, d)
        self.states: dict[int, SSGNode] = {}
        self.roots: dict[int, SSGNode] = {}
        self._seq = count()
        self._sr: dict[int, SSGNode] = {}
        self._cur_lo = 0
        # Section 5.3 termination hook (SSG_O): an inadmissible object
        # set is never added to the graph — and since admissibility is
        # monotone for >=-only workloads, none of its subsets will ever
        # be generated through it either (subtree never built).
        self.admit = admit
        self.gc_every = gc_every if gc_every is not None else w
        self.stats = {"visits": 0}

    # ------------------------------------------------------------------
    # graph plumbing
    # ------------------------------------------------------------------
    def _add_edge(self, p: SSGNode, c: SSGNode) -> None:
        """Insert edge ``p -> c`` preserving Properties 1 and 2."""
        if p is c:
            return
        for c2 in list(p.children):
            if c2 is c:
                return
            if c.objset & c2.objset == c.objset:
                # c subsumed by an existing sibling: place it deeper.
                self._add_edge(c2, c)
                return
        for c2 in list(p.children):
            if c2.objset & c.objset == c2.objset:
                # existing sibling subsumed by c: re-parent (§4.3.4).
                p.children.discard(c2)
                c2.parents.discard(p)
                self._add_edge(c, c2)
        p.children.add(c)
        c.parents.add(p)
        self.roots.pop(c.objset, None)

    def _remove_node(self, node: SSGNode) -> None:
        """Detach an (invalid/expired) node, re-wiring its children."""
        if self.states.get(node.objset) is node:
            del self.states[node.objset]
        self.roots.pop(node.objset, None)
        parents = list(node.parents)
        children = list(node.children)
        for p in parents:
            p.children.discard(node)
        for c in children:
            c.parents.discard(node)
        node.parents.clear()
        node.children.clear()
        for c in children:
            for p in parents:
                self._add_edge(p, c)
            if not c.parents:
                self.roots[c.objset] = c

    def _new_node(self, state: State) -> SSGNode:
        node = SSGNode(state, next(self._seq))
        self.states[state.objset] = node
        self.roots[state.objset] = node  # until an edge gives it a parent
        return node

    # ------------------------------------------------------------------
    # ST traversal (Algorithm 1) — iterative for Python-level speed
    # ------------------------------------------------------------------
    def _traverse(
        self,
        fid: int,
        lo: int,
        objs_mask: int,
        gen_map: dict[int, list[SSGNode]],
    ) -> None:
        stack = sorted(self.roots.values(), key=lambda n: -n.seq)
        visits = 0
        get_bucket = gen_map.get
        while stack:
            node = stack.pop()
            if node.flag == fid:
                continue
            node.flag = fid
            visits += 1
            st = node.state
            if st.mark < lo:
                # Invalid (newest key frame expired): remove, keep
                # traversing its former children, which may be live.
                children = list(node.children)
                self._remove_node(node)
                stack.extend(children)
                continue
            fr = st.frames
            if fr and fr[0] < lo:
                st.expire(lo)  # pruneState
            inter = st.objset & objs_mask
            if not inter:
                continue  # descendants' intersections are subsets: skip
            bucket = get_bucket(inter)
            if bucket is None:
                gen_map[inter] = [node]
            else:
                bucket.append(node)
            for c in node.children:  # push only unvisited children
                if c.flag != fid:
                    stack.append(c)
        self.stats["visits"] += visits

    # ------------------------------------------------------------------
    # frame processing
    # ------------------------------------------------------------------
    def advance(self, fid: int, objs_mask: int) -> None:
        """Process one arriving frame (fids strictly increasing)."""
        lo = self.win.lo(fid)
        self._cur_lo = lo
        if self.gc_every and fid % self.gc_every == 0:
            self._gc(lo)
        gen_map: dict[int, list[SSGNode]] = {}
        if objs_mask:
            self._traverse(fid, lo, objs_mask, gen_map)
        updated: list[SSGNode] = []
        # Apply creation/append/marking over the generator map.  Order
        # does not matter: ``_add_edge`` enforces Property 2 in both
        # directions (placing a subsumed child deeper / re-parenting a
        # subsumed sibling), which realises the CNPS selection without
        # the explicit descending-cardinality sort of §4.3.5.
        for inter, glist in gen_map.items():
            node = self.states.get(inter)
            if node is not None:
                node.state.append_frame(fid)
                for g in glist:
                    if g.state.mark > node.state.mark:
                        node.state.mark = g.state.mark  # §4.3.6 marking
            else:
                if self.admit is not None and not self.admit(inter):
                    continue
                fr = merge_sorted_unique([g.state.frames for g in glist])
                if not fr or fr[-1] != fid:
                    fr.append(fid)
                node = self._new_node(State(inter, fr, max(g.state.mark for g in glist)))
                # One superset parent suffices: the node is visited
                # whenever its own intersection is non-empty because
                # every ancestor is a superset (Property 1), so the
                # remaining generator edges of §4.3.3 would only add
                # redundant traversal paths, never extra pruning.
                self._add_edge(glist[0], node)
            updated.append(node)
        # Principal state for the arriving frame (marks its own fid),
        # plus CNPS: connect it above every intersection state.
        ns = None
        ns_is_new = False
        if objs_mask and (self.admit is None or self.admit(objs_mask)):
            ns = self.states.get(objs_mask)
            if ns is None:
                ns_is_new = True
                ns = self._new_node(State(objs_mask, [fid], fid))
                updated.append(ns)
            else:
                ns.state.append_frame(fid)
                ns.state.mark = fid
                updated.append(ns)  # may appear twice; SR dict dedups
            ns.flag = fid
            if ns_is_new:
                # CNPS: connect the new principal state (§4.3.5).  When
                # ns already existed, all these edges were added the
                # frame it was created — re-adding them every frame is
                # pure overhead (and was the dominant SSG cost).
                for g in gen_map.get(objs_mask, ()):  # states above ns
                    if g is not ns:
                        self._add_edge(g, ns)
                for inter in gen_map:
                    if inter != objs_mask:
                        node = self.states.get(inter)
                        if node is not None:
                            self._add_edge(ns, node)
        # Result State Set: revalidated previous SR plus states updated
        # at this frame (§4.3.7).
        d = self.win.d
        new_sr: dict[int, SSGNode] = {}
        for mask, node in self._sr.items():
            if (
                self.states.get(mask) is node
                and node.state.is_valid(lo)
                and node.state.n_live_frames(lo) >= d
            ):
                new_sr[mask] = node
        for node in updated:
            if node.state.is_valid(lo) and node.state.n_live_frames(lo) >= d:
                new_sr[node.objset] = node
        self._sr = new_sr

    def _gc(self, lo: int) -> None:
        """Sweep states never revisited (empty intersections forever)."""
        for mask in list(self.states):
            node = self.states.get(mask)
            if node is None:
                continue
            if node.state.mark < lo:
                self._remove_node(node)
                continue
            node.state.expire(lo)

    # ------------------------------------------------------------------
    # results / introspection
    # ------------------------------------------------------------------
    def results(self) -> dict[int, list[int]]:
        """Satisfied valid states (the Result State Set)."""
        lo = self._cur_lo
        return {mask: node.state.live_frames(lo) for mask, node in self._sr.items()}

    def n_states(self) -> int:
        return len(self.states)

    def iter_nodes(self) -> Iterator[SSGNode]:
        return iter(self.states.values())

    def check_invariants(self) -> None:
        """Structural invariants, asserted by tests after every frame."""
        for node in self.states.values():
            assert self.states.get(node.objset) is node
            for c in node.children:
                assert c.objset & node.objset == c.objset and c.objset != node.objset, (
                    "Property 1 violated"
                )
                assert node in c.parents
            kids = list(node.children)
            for i, a in enumerate(kids):
                for b in kids[i + 1 :]:
                    ab = a.objset & b.objset
                    assert ab != a.objset and ab != b.objset, "Property 2 violated"
            if not node.parents:
                assert node.objset in self.roots, "orphan not registered as root"
        for mask, node in self.roots.items():
            assert self.states.get(mask) is node and not node.parents
