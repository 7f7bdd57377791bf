"""Tempura memo: logical-equivalence groups plus explicit TVR nodes.

The traditional Cascades memo only captures logical/physical
equivalence; Tempura adds TVR nodes with *intra-TVR* relationships
(which group is which snapshot/delta of a TVR) and *inter-TVR* links
(e.g. "this TVR is the Q^P part of that one"). §5.1/§5.3 of the paper;
``TvrMetaSet`` there is :class:`Tvr` here, and the intra-TVR trait is
the :data:`Instant` key.

Instants are tuples:

* ``('snap', i, persp)`` — snapshot at time ``t_i``
* ``('delta', i, j, persp)`` — delta from ``t_i`` to ``t_j``

with ``persp`` either ``'mult'`` (multiplicity perspective) or
``'state'`` (attribute perspective / aggregate states).

Expressions are hash-consed: registering an expression that already
exists merges the two groups (union-find), mirroring Calcite's RelSet
merging.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Optional

Instant = tuple


def snap(i: int, persp: str = "mult") -> Instant:
    return ("snap", i, persp)


def delta(i: int, j: int, persp: str = "mult") -> Instant:
    return ("delta", i, j, persp)


@dataclass(frozen=True)
class MExpr:
    """One operator alternative inside a group; children are group ids."""

    kind: str
    payload: tuple
    children: tuple[int, ...]


@dataclass
class Group:
    gid: int
    tvr: int
    instant: Instant
    exprs: list[MExpr] = field(default_factory=list)


@dataclass
class Tvr:
    tid: int
    node: object  # the logical AST node this TVR computes (or a tag)
    instants: dict[Instant, int] = field(default_factory=dict)
    links: dict[str, int] = field(default_factory=dict)  # inter-TVR edges


class Memo:
    def __init__(self):
        self.groups: list[Group] = []
        self.tvrs: list[Tvr] = []
        self._parent: list[int] = []  # union-find over group ids
        self._expr_index: dict[MExpr, int] = {}
        self._node_tvr: dict[object, int] = {}  # AST node -> tvr (dedup)
        self.n_registrations = 0  # instrumentation: attempted registers
        self.version = 0  # bumped on every structural change

    # -- union-find --------------------------------------------------------

    def find(self, gid: int) -> int:
        while self._parent[gid] != gid:
            self._parent[gid] = self._parent[self._parent[gid]]
            gid = self._parent[gid]
        return gid

    def _union(self, a: int, b: int) -> int:
        a, b = self.find(a), self.find(b)
        if a == b:
            return a
        keep, drop = (a, b) if a < b else (b, a)
        self._parent[drop] = keep
        kg, dg = self.groups[keep], self.groups[drop]
        for e in dg.exprs:
            if e not in kg.exprs:
                kg.exprs.append(e)
        # repoint tvr instants at the surviving group
        for t in self.tvrs:
            for inst, g in list(t.instants.items()):
                if self.find(g) != g:
                    t.instants[inst] = self.find(g)
        self.version += 1
        return keep

    # -- tvrs --------------------------------------------------------------

    def tvr_for_node(self, node: object) -> int:
        """Get-or-create the TVR computing logical ``node``."""
        if node in self._node_tvr:
            return self._node_tvr[node]
        tid = len(self.tvrs)
        self.tvrs.append(Tvr(tid, node))
        self._node_tvr[node] = tid
        self.version += 1
        return tid

    def new_tvr(self, tag: object) -> int:
        tid = len(self.tvrs)
        self.tvrs.append(Tvr(tid, tag))
        self.version += 1
        return tid

    def link(self, tid: int, rel: str, other: int) -> None:
        if self.tvrs[tid].links.get(rel) != other:
            self.tvrs[tid].links[rel] = other
            self.version += 1

    # -- groups / expressions ---------------------------------------------

    def group_of(self, tid: int, instant: Instant) -> Optional[int]:
        g = self.tvrs[tid].instants.get(instant)
        return None if g is None else self.find(g)

    def register(self, tid: int, instant: Instant, expr: MExpr) -> int:
        """Register ``expr`` as an alternative for (tvr, instant).

        Hash-consing: the canonical form (children resolved through
        union-find) indexes existing groups; a duplicate registration in
        a different group merges the groups.
        """
        self.n_registrations += 1
        expr = MExpr(
            expr.kind, expr.payload, tuple(self.find(c) for c in expr.children)
        )
        tvr = self.tvrs[tid]
        target = tvr.instants.get(instant)
        if target is not None:
            target = self.find(target)
        existing = self._expr_index.get(expr)
        if existing is not None:
            existing = self.find(existing)
        if target is None and existing is None:
            gid = len(self.groups)
            self.groups.append(Group(gid, tid, instant, [expr]))
            self._parent.append(gid)
            self._expr_index[expr] = gid
            tvr.instants[instant] = gid
            self.version += 1
            return gid
        if target is None:
            tvr.instants[instant] = existing
            self.version += 1
            return existing
        if existing is None:
            if expr not in self.groups[target].exprs:
                self.groups[target].exprs.append(expr)
                self.version += 1
            self._expr_index[expr] = target
            return target
        if existing != target:
            return self._union(existing, target)
        return target

    # -- views -------------------------------------------------------------

    def all_groups(self) -> list[Group]:
        """Canonical groups only (union-find representatives)."""
        return [g for g in self.groups if self.find(g.gid) == g.gid]

    def exprs_of(self, gid: int) -> list[MExpr]:
        return self.groups[self.find(gid)].exprs

    def stats(self) -> dict[str, int]:
        gs = self.all_groups()
        return {
            "groups": len(gs),
            "exprs": sum(len(g.exprs) for g in gs),
            "tvrs": len(self.tvrs),
            "registrations": self.n_registrations,
        }
