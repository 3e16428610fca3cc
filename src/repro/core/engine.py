"""CROWN: change propagation without joins (§4–§5 of the paper).

``CrownEngine`` maintains, for every node ``e`` of a free-connex
generalized join tree:

- the relation ``R_e`` (real for input relations, virtual for
  generalized nodes) with a *derivation counter* per tuple — the number
  of children ``e_i`` whose projection view contains ``t[key(e_i)]``;
- the semi-join view ``V_s(R_e)`` = tuples whose counter equals the
  number of children (Algorithms 2–4: R-/S-/P-UPDATE);
- the projection view ``V_p(R_e) = π_key(e) V_s(R_e)`` via grouped hash
  indexes (derivation counting);
- the live view ``V_l(R_e) = π_{e∩y} Q(D)`` (Lemma 5.5), used for
  witness detection (Def. 5.6) and the delta-enumeration chains.

Per update the engine emits the exact delta ``ΔQ(D, t)`` (Algorithm 6)
and supports full enumeration (Algorithm 5). Deletions are two-phase:
a non-mutating *probe* computes every view change, the delta is
enumerated against the pre-deletion state ("delta enumeration upon a
deletion is done before the tuple deletion"), then the probe's journal
is applied.

Design notes (see DESIGN.md § semantic decisions): witnesses use
``Δ(π_y V_s)`` via projection refcounts; witness checks and S-chains
exclude the current update's own Δ values at every chain node, which
realizes the "highest changed node claims the result" disjointness
argument of Lemma 5.7 for insertions and deletions alike.
"""
from __future__ import annotations

import itertools
from collections import Counter
from typing import Callable, Iterable, Iterator

from repro.cq.join_tree import JoinTree, best_tree
from repro.cq.query import CQ
from repro.streams.sequences import Update

YDict = dict[str, object]


def _proj(t: tuple, pos: tuple[int, ...]) -> tuple:
    return tuple(t[i] for i in pos)


class _Node:
    """Mutable per-node state (views, counters, hash indexes)."""

    def __init__(self, tree: JoinTree, name: str, y: frozenset[str]) -> None:
        tn = tree.node(name)
        self.name = name
        self.attrs: tuple[str, ...] = tn.attrs
        self.is_gen = tn.is_generalized
        self.parent: str | None = tn.parent
        self.children: tuple[str, ...] = tn.children
        self.is_root = tn.parent is None
        aset = set(self.attrs)
        parent_attrs = set(tree.node(tn.parent).attrs) if tn.parent else set()

        def pos_of(sub: Iterable[str]) -> tuple[int, ...]:
            return tuple(self.attrs.index(a) for a in sub)

        self.key_attrs = tuple(sorted(aset & parent_attrs))
        self.key_pos = pos_of(self.key_attrs)
        self.y_attrs = tuple(sorted(aset & y))
        self.y_pos = pos_of(self.y_attrs)
        self.boundary = bool(aset - y)
        # extra output attrs beyond the parent key (Algorithm 5 line 2/3)
        self.extra_y = bool(set(self.y_attrs) - set(self.key_attrs))
        self.key_y_attrs = tuple(sorted(set(self.key_attrs) & y))
        self.key_y_in_y = tuple(self.y_attrs.index(a) for a in self.key_y_attrs)
        self.ck_pos: dict[str, tuple[int, ...]] = {}
        self.cky_in_y: dict[str, tuple[int, ...]] = {}
        for c in self.children:
            ck = sorted(aset & set(tree.node(c).attrs))
            self.ck_pos[c] = pos_of(ck)
            cky = sorted(set(ck) & y)
            self.cky_in_y[c] = tuple(self.y_attrs.index(a) for a in cky)
        # defining children (generalized nodes): children whose attrs
        # contain this node's — their V_p's union forms the virtual
        # relation R_e (Example 4.2 generalized; see DESIGN.md)
        self.def_children: frozenset[str] = frozenset(
            c for c in self.children
            if self.is_gen and aset <= set(tree.node(c).attrs)
        )
        # dynamic state
        self.tuples: dict[tuple, int] = {}
        self.def_pres: dict[tuple, int] = {}  # defining-support refcounts
        self.child_index: dict[str, dict[tuple, set]] = (
            {c: {} for c in self.children if c not in self.def_children}
            if self.children
            else {}
        )
        self.vs_by_key: dict[tuple, set] = {}
        self.vs_yproj: dict[tuple, int] = {}
        self.needs_kyproj = self.boundary and self.extra_y
        self.vs_key_yproj: dict[tuple, dict[tuple, int]] = {}
        self.live_maintained = bool(self.children) and (
            bool(self.y_attrs) or not self.attrs
        )
        self.live: set | None = set() if self.live_maintained else None
        self.live_idx: dict[str, dict[tuple, set]] = (
            {c: {} for c in self.children} if self.live_maintained else {}
        )

    @property
    def n_children(self) -> int:
        return len(self.children)

    def in_vs(self, t: tuple) -> bool:
        return self.tuples.get(t, -1) == self.n_children

    # -- V_s index bookkeeping (S-UPDATE's derivation counting) --------
    def _vs_add(self, t: tuple) -> tuple[tuple | None, tuple | None]:
        """Add ``t`` to V_s indexes; return (new V_p key, new π_y value)."""
        kv = _proj(t, self.key_pos)
        s = self.vs_by_key.setdefault(kv, set())
        s.add(t)
        new_vp = kv if (len(s) == 1 and not self.is_root) else None
        yv = _proj(t, self.y_pos)
        c = self.vs_yproj.get(yv, 0) + 1
        self.vs_yproj[yv] = c
        new_y = yv if c == 1 else None
        if self.needs_kyproj:
            d = self.vs_key_yproj.setdefault(kv, {})
            d[yv] = d.get(yv, 0) + 1
        return new_vp, new_y

    def _vs_remove(self, t: tuple) -> None:
        kv = _proj(t, self.key_pos)
        s = self.vs_by_key[kv]
        s.discard(t)
        if not s:
            del self.vs_by_key[kv]
        yv = _proj(t, self.y_pos)
        c = self.vs_yproj[yv] - 1
        if c:
            self.vs_yproj[yv] = c
        else:
            del self.vs_yproj[yv]
        if self.needs_kyproj:
            d = self.vs_key_yproj[kv] if kv in self.vs_key_yproj else None
            if d is not None:
                d[yv] -= 1
                if not d[yv]:
                    del d[yv]
                if not d:
                    del self.vs_key_yproj[kv]


class CrownEngine:
    """The paper's framework: join-free change propagation + enumeration.

    Parameters
    ----------
    cq : the (free-connex) conjunctive query.
    tree : a free-connex generalized join tree; ``best_tree(cq)`` when
        omitted (§6.3 heuristic).
    post_filter : optional predicate over result dicts, applied at
        emission only (selections over output attrs, e.g. SNB Q3's
        ``<>``); internal views maintain the unfiltered query.
    emit_deltas : when False, ``apply`` skips witness detection and
        delta enumeration (pure maintenance mode, used by the
        enclosureness experiments and for bulk loading).
    """

    def __init__(
        self,
        cq: CQ,
        tree: JoinTree | None = None,
        post_filter: Callable[[YDict], bool] | None = None,
        emit_deltas: bool = True,
    ) -> None:
        self.cq = cq
        self.tree = tree if tree is not None else best_tree(cq)
        if (
            tuple((r.name, r.attrs) for r in self.tree.cq.relations)
            != tuple((r.name, r.attrs) for r in cq.relations)
            or set(self.tree.cq.output) != set(cq.output)
        ):
            raise ValueError("tree was built for a different query/output")
        if not self.tree.is_free_connex_tree():
            raise ValueError("tree is not a valid free-connex join tree")
        self.post_filter = post_filter
        self.emit_deltas = emit_deltas
        y = cq.output_set
        self.nodes: dict[str, _Node] = {
            n: _Node(self.tree, n, y) for n in self.tree.nodes
        }
        self._atom_node = {
            r.name: self.tree.relation_node(r.name) for r in cq.relations
        }
        self._selections: dict[str, list] = {}
        for rel, pred in cq.selections:
            self._selections.setdefault(rel, []).append(pred)
        # live nodes ordered root-first (deletion check is top-down)
        order = {n: i for i, n in enumerate(self._preorder())}
        self._live_nodes = sorted(
            (n for n in self.nodes.values() if n.live_maintained),
            key=lambda n: order[n.name],
        )
        self.stats = {"counter_changes": 0, "updates": 0, "deltas": 0}

    def _preorder(self) -> list[str]:
        out, stack = [], [self.tree.root]
        while stack:
            cur = stack.pop()
            out.append(cur)
            stack.extend(self.nodes[cur].children)
        return out

    # ------------------------------------------------------------------
    # update entry points
    # ------------------------------------------------------------------
    def apply(self, u: Update) -> list[tuple[int, tuple]]:
        """Process one update; return the delta as ``[(±1, y-tuple)]``."""
        out: list[tuple[int, tuple]] = []
        for atom in self.cq.atoms_of_stream(u.stream):
            if any(not p(u.tuple) for p in self._selections.get(atom.name, ())):
                continue  # §7.2: selection discards the update in O(1)
            out.extend(self._apply_atom(atom.name, u.tuple, u.is_insert))
        self.stats["updates"] += 1
        self.stats["deltas"] += len(out)
        return out

    def apply_atom(self, rel: str, t: tuple, is_insert: bool) -> list[tuple[int, tuple]]:
        """Atom-level update (used by the HyperCube-partitioned engine,
        which dispatches each self-join copy independently)."""
        if any(not p(t) for p in self._selections.get(rel, ())):
            return []
        out = self._apply_atom(rel, t, is_insert)
        self.stats["updates"] += 1
        self.stats["deltas"] += len(out)
        return out

    def run(self, seq: Iterable[Update]) -> list[tuple[int, tuple]]:
        out: list[tuple[int, tuple]] = []
        for u in seq:
            out.extend(self.apply(u))
        return out

    def bulk_load(self, db: dict[str, Iterable[tuple]]) -> None:
        """Load initial data (insertion-only, deltas suppressed), then
        rebuild live views from one full enumeration (O(|Q(D)|))."""
        keep = self.emit_deltas
        self.emit_deltas = False
        for stream, rows in db.items():
            for t in rows:
                self.apply(Update(stream, tuple(t), True))
        self.emit_deltas = keep
        if self.emit_deltas:
            self.rebuild_live()

    def _apply_atom(self, rel: str, t: tuple, is_insert: bool) -> list[tuple[int, tuple]]:
        name = self._atom_node[rel]
        node = self.nodes[name]
        if is_insert and t in node.tuples:
            return []  # set semantics: non-effective update
        if not is_insert and t not in node.tuples:
            return []
        if is_insert:
            changes = self._insert_propagate(name, t)
            results = self._collect_deltas(changes) if self.emit_deltas else []
            if self.emit_deltas:
                self._live_insert(results)
        else:
            changes, plan = self._delete_probe(name, t)
            results = self._collect_deltas(changes) if self.emit_deltas else []
            self._delete_apply(plan)
            if self.emit_deltas:
                self._live_delete(results)
        sign = 1 if is_insert else -1
        emit = []
        for r in results:
            if self.post_filter and not self.post_filter(r):
                continue
            emit.append((sign, tuple(r[a] for a in self.cq.output)))
        return emit

    # ------------------------------------------------------------------
    # propagation (Algorithms 2–4, level-wise along the path to root)
    # ------------------------------------------------------------------
    def _insert_propagate(self, e0: str, t: tuple) -> dict[str, dict[str, set]]:
        changes: dict[str, dict[str, set]] = {}
        node = self.nodes[e0]
        # R-UPDATE (Algorithm 4): count satisfied children
        cnt = self._child_sat_count(node, t)
        for c in node.children:
            node.child_index[c].setdefault(_proj(t, node.ck_pos[c]), set()).add(t)
        node.tuples[t] = cnt
        self.stats["counter_changes"] += 1
        entering: list[tuple] = [t] if cnt == node.n_children else []
        while True:
            vs_d, y_d, vp_d = set(), set(), set()
            for t2 in entering:
                vs_d.add(t2)
                new_vp, new_y = node._vs_add(t2)
                if new_vp is not None:
                    vp_d.add(new_vp)
                if new_y is not None:
                    y_d.add(new_y)
            if vs_d:
                changes[node.name] = {"vs": vs_d, "y": y_d, "vp": vp_d}
            if node.is_root or not vp_d:
                break
            child, node = node, self.nodes[node.parent]
            entering = []
            if child.name in node.def_children:
                # P-UPDATE from a defining child of a generalized node:
                # the child's new V_p keys are candidate tuples of the
                # virtual relation R_e (intersection counting, eq. (4),
                # generalized to mixed-key children)
                for kv in vp_d:
                    if kv in node.def_pres:
                        node.def_pres[kv] += 1
                        c2 = node.tuples[kv] + 1
                        node.tuples[kv] = c2
                        self.stats["counter_changes"] += 1
                        if c2 == node.n_children:
                            entering.append(kv)
                    else:
                        node.def_pres[kv] = 1
                        c2 = self._child_sat_count(node, kv)
                        node.tuples[kv] = c2
                        self.stats["counter_changes"] += 1
                        for c in node.children:
                            if c not in node.def_children:
                                node.child_index[c].setdefault(
                                    _proj(kv, node.ck_pos[c]), set()
                                ).add(kv)
                        if c2 == node.n_children:
                            entering.append(kv)
            else:
                # P-UPDATE (Algorithm 3): bump counters of matching tuples
                idx = node.child_index[child.name]
                for kv in vp_d:
                    for t2 in idx.get(kv, ()):
                        c2 = node.tuples[t2] + 1
                        node.tuples[t2] = c2
                        self.stats["counter_changes"] += 1
                        if c2 == node.n_children:
                            entering.append(t2)
        return changes

    def _child_sat_count(self, node: _Node, t: tuple) -> int:
        """#children c with t[key(c)] ∈ V_p(c) (Algorithm 4 lines 3–5)."""
        cnt = 0
        for c in node.children:
            if _proj(t, node.ck_pos[c]) in self.nodes[c].vs_by_key:
                cnt += 1
        return cnt

    def _delete_probe(
        self, e0: str, t: tuple
    ) -> tuple[dict[str, dict[str, set]], list]:
        """Non-mutating pass: compute all view changes + an apply plan."""
        changes: dict[str, dict[str, set]] = {}
        plan: list[dict] = []
        node = self.nodes[e0]
        leaving: set = {t} if node.in_vs(t) else set()
        child_name: str | None = None
        vp_below: set = set()
        while True:
            y_d, vp_d = set(), set()
            ycnt = Counter(_proj(t2, node.y_pos) for t2 in leaving)
            for yv, c in ycnt.items():
                if node.vs_yproj.get(yv, 0) == c:
                    y_d.add(yv)
            kcnt = Counter(_proj(t2, node.key_pos) for t2 in leaving)
            for kv, c in kcnt.items():
                if not node.is_root and len(node.vs_by_key.get(kv, ())) == c:
                    vp_d.add(kv)
            if leaving:
                changes[node.name] = {"vs": set(leaving), "y": y_d, "vp": vp_d}
            plan.append(
                {
                    "node": node.name,
                    "child": child_name,
                    "vp_below": vp_below,
                    "leaving": set(leaving),
                    "removed": t if child_name is None else None,
                }
            )
            if node.is_root or not vp_d:
                break
            child_name, vp_below = node.name, vp_d
            node = self.nodes[node.parent]
            leaving = set()
            if child_name in node.def_children:
                for kv in vp_d:
                    if node.tuples.get(kv, -1) == node.n_children:
                        leaving.add(kv)
            else:
                idx = node.child_index[child_name]
                for kv in vp_d:
                    for t2 in idx.get(kv, ()):
                        if node.tuples[t2] == node.n_children:
                            leaving.add(t2)
        return changes, plan

    def _delete_apply(self, plan: list[dict]) -> None:
        for lvl in plan:
            node = self.nodes[lvl["node"]]
            if lvl["removed"] is not None:
                t = lvl["removed"]
                del node.tuples[t]
                self.stats["counter_changes"] += 1
                for c in node.children:
                    kv = _proj(t, node.ck_pos[c])
                    s = node.child_index[c].get(kv)
                    if s is not None:
                        s.discard(t)
                        if not s:
                            del node.child_index[c][kv]
            else:
                if lvl["child"] in node.def_children:
                    for kv in lvl["vp_below"]:
                        node.tuples[kv] -= 1
                        self.stats["counter_changes"] += 1
                        node.def_pres[kv] -= 1
                        if node.def_pres[kv] == 0:
                            # last defining support gone: candidate vanishes
                            del node.def_pres[kv]
                            del node.tuples[kv]
                            for c in node.children:
                                if c in node.def_children:
                                    continue
                                ck = _proj(kv, node.ck_pos[c])
                                s = node.child_index[c].get(ck)
                                if s is not None:
                                    s.discard(kv)
                                    if not s:
                                        del node.child_index[c][ck]
                else:
                    idx = node.child_index[lvl["child"]]
                    for kv in lvl["vp_below"]:
                        for t2 in idx.get(kv, ()):
                            node.tuples[t2] -= 1
                            self.stats["counter_changes"] += 1
            for t2 in lvl["leaving"]:
                node._vs_remove(t2)

    # ------------------------------------------------------------------
    # witnesses (Def. 5.6) and delta enumeration (Algorithm 6)
    # ------------------------------------------------------------------
    def _witnesses(self, changes: dict[str, dict[str, set]]) -> list[tuple[str, tuple]]:
        out: list[tuple[str, tuple]] = []
        for name, ch in changes.items():
            node = self.nodes[name]
            if node.is_root:
                out.extend(("__root__", t2) for t2 in ch["vs"])
                continue
            if not node.y_attrs:
                continue
            parent = self.nodes[node.parent]
            if parent.live is None:
                continue
            excl = changes.get(parent.name, {}).get("y", set())
            pidx = parent.live_idx[name]
            for yv in ch["y"]:
                jv = _proj(yv, node.key_y_in_y)
                if any(lv not in excl for lv in pidx.get(jv, ())):
                    out.append((name, yv))
        return out

    def _collect_deltas(self, changes: dict[str, dict[str, set]]) -> list[YDict]:
        results: list[YDict] = []
        for wname, wval in self._witnesses(changes):
            results.extend(self._enum_witness(wname, wval, changes))
        return results

    def _enum_witness(
        self, wname: str, wval: tuple, changes: dict[str, dict[str, set]]
    ) -> Iterator[YDict]:
        if wname == "__root__":
            yield from self._enum_tuple_dicts(self.tree.root, wval)
            return
        node = self.nodes[wname]
        path = self.tree.path_to_root(wname)
        # S-chain: join the witness with live views up to the root,
        # excluding this update's own Δ(π_y V_s) values (disjointness).
        partials: list[YDict] = [dict(zip(node.y_attrs, wval))]
        prev = node
        for fname in path[1:]:
            f = self.nodes[fname]
            excl = changes.get(fname, {}).get("y", set())
            idx = f.live_idx[prev.name]
            nxt: list[YDict] = []
            for p_ in partials:
                jv = tuple(p_[a] for a in prev.key_y_attrs)
                for lv in idx.get(jv, ()):
                    if lv in excl:
                        continue
                    d = dict(p_)
                    d.update(zip(f.y_attrs, lv))
                    nxt.append(d)
            partials = nxt
            if not partials:
                return
            prev = f
        for q in partials:
            parts: list[list[YDict]] = []
            if node.boundary:
                parts.append([{}])  # subtree contributes only e∩y ⊆ q
            else:
                te = tuple(q[a] for a in node.attrs)
                parts.append(list(self._enum_tuple_dicts(wname, te)))
            prev_name = wname
            for fname in path[1:]:
                f = self.nodes[fname]
                if f.boundary:
                    parts.append([{}])
                else:
                    tf = tuple(q[a] for a in f.attrs)
                    gens = [
                        list(self._enum_key(c, _proj(tf, f.ck_pos[c])))
                        for c in f.children
                        if c != prev_name
                    ]
                    merged: list[YDict] = []
                    for combo in itertools.product(*gens):
                        d: YDict = {}
                        for piece in combo:
                            d.update(piece)
                        merged.append(d)
                    parts.append(merged)
                prev_name = fname
            for combo in itertools.product(*parts):
                r = dict(q)
                for piece in combo:
                    r.update(piece)
                yield r

    # ------------------------------------------------------------------
    # full enumeration (Algorithm 5)
    # ------------------------------------------------------------------
    def _enum_tuple_dicts(self, name: str, t: tuple) -> Iterator[YDict]:
        """Join results of the subtree at ``name`` containing V_s tuple
        ``t`` (requires ``name``'s attrs ⊆ y)."""
        node = self.nodes[name]
        base: YDict = dict(zip(node.attrs, t))
        gens = [
            list(self._enum_key(c, _proj(t, node.ck_pos[c])))
            for c in node.children
        ]
        for combo in itertools.product(*gens):
            r = dict(base)
            for piece in combo:
                r.update(piece)
            yield r

    def _enum_key(self, name: str, kv: tuple) -> Iterator[YDict]:
        """FullEnum(T, e, t[key(e)]): results of the subtree at ``name``
        joining a parent V_s tuple whose key projection is ``kv``.
        Invariant: the caller's tuple is in the parent's V_s, hence
        ``kv ∈ V_p`` here."""
        node = self.nodes[name]
        if node.boundary:
            if not node.extra_y:
                yield {}  # Algorithm 5 line 2
            else:
                for yv in node.vs_key_yproj.get(kv, ()):  # line 3, distinct
                    yield dict(zip(node.y_attrs, yv))
        else:
            for t2 in node.vs_by_key.get(kv, ()):
                yield from self._enum_tuple_dicts(name, t2)

    def enumerate_full(self) -> Iterator[tuple]:
        """Constant-delay full enumeration of Q(D) (Lemma 5.3)."""
        for r in self._enum_full_dicts():
            if self.post_filter and not self.post_filter(r):
                continue
            yield tuple(r[a] for a in self.cq.output)

    def _enum_full_dicts(self) -> Iterator[YDict]:
        root = self.nodes[self.tree.root]
        for t in list(root.vs_by_key.get((), ())):
            yield from self._enum_tuple_dicts(root.name, t)

    def full_result_set(self) -> set[tuple]:
        return set(self.enumerate_full())

    # ------------------------------------------------------------------
    # live views (Lemma 5.5), maintained after each delta enumeration
    # ------------------------------------------------------------------
    def _live_add(self, node: _Node, lv: tuple) -> None:
        if lv in node.live:
            return
        node.live.add(lv)
        for c in node.children:
            node.live_idx[c].setdefault(_proj(lv, node.cky_in_y[c]), set()).add(lv)

    def _live_discard(self, node: _Node, lv: tuple) -> None:
        if lv not in node.live:
            return
        node.live.remove(lv)
        for c in node.children:
            jv = _proj(lv, node.cky_in_y[c])
            s = node.live_idx[c].get(jv)
            if s is not None:
                s.discard(lv)
                if not s:
                    del node.live_idx[c][jv]

    def _live_insert(self, results: list[YDict]) -> None:
        for node in self._live_nodes:
            for r in results:
                self._live_add(node, tuple(r[a] for a in node.y_attrs))

    def _live_delete(self, results: list[YDict]) -> None:
        # top-down: parent live views settle before children are checked
        for node in self._live_nodes:
            parent = self.nodes[node.parent] if node.parent else None
            for r in results:
                lv = tuple(r[a] for a in node.y_attrs)
                if lv not in node.live:
                    continue
                if lv not in node.vs_yproj:
                    self._live_discard(node, lv)
                    continue
                if parent is not None and parent.live is not None:
                    jv = _proj(lv, node.key_y_in_y)
                    if not parent.live_idx[node.name].get(jv):
                        self._live_discard(node, lv)

    def rebuild_live(self) -> None:
        """Recompute every live view from one full enumeration."""
        for node in self._live_nodes:
            node.live.clear()
            for c in node.children:
                node.live_idx[c].clear()
        for r in self._enum_full_dicts():
            for node in self._live_nodes:
                self._live_add(node, tuple(r[a] for a in node.y_attrs))

    # ------------------------------------------------------------------
    # introspection
    # ------------------------------------------------------------------
    def space(self) -> int:
        """Total stored entries across all views/indexes (Lemma 4.1)."""
        total = 0
        for n in self.nodes.values():
            total += len(n.tuples)
            total += sum(len(s) for idx in n.child_index.values() for s in idx.values())
            total += sum(len(s) for s in n.vs_by_key.values())
            total += len(n.vs_yproj)
            total += sum(len(d) for d in n.vs_key_yproj.values())
            if n.live is not None:
                total += len(n.live)
        return total

    @staticmethod
    def capabilities() -> dict[str, object]:
        """Row of the paper's Table 1 for CROWN."""
        return {
            "system": "CROWN",
            "distributed": True,  # via repro.spark.partitioned
            "full_enumeration": True,
            "delta_enumeration": True,
            "updates": "arbitrary",
            "internal": "this paper",
        }
