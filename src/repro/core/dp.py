"""Plan selection (§6): temporal DP over (group, execution time).

Extends classic Cascades costing with the paper's Eq. 6: the DP state
space is {group} × t-dom, each state records the best cost of computing
the group's relation if its producing operator runs at time τ. A child
consumed at a later time than it is produced pays Save/Load; a child in
the ``shared`` set (chosen by the MQO greedy, §6.3) is paid for once at
its materialization time and only Load is charged at each use.

Costs are per-time vectors compared under ``c̃_w`` (weighted) or ``c̃_v``
(reverse-lexical) — both satisfy optimal substructure (Theorem 6).

`extract` walks the chosen alternatives into an executable task graph
and recomputes the *actual* cost of the deduplicated graph (shared
sub-plans counted once), which is the number reported everywhere.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.core import cost as C
from repro.core.memo import MExpr, Memo
from repro.core.stats import StatsProvider

INF = float("inf")


@dataclass
class PlanContext:
    """Costing state shared by every Selector of one optimization run."""

    memo: Memo
    stats: StatsProvider
    k: int
    mode: str  # 'weighted' | 'vector'
    weights: tuple[float, ...]
    cards: dict[int, float] = field(default_factory=dict)
    avail: dict[int, int] = field(default_factory=dict)
    _work: dict[MExpr, float] = field(default_factory=dict)

    def __post_init__(self):
        self.cards = C.estimate_cards(self.memo, self.stats)
        self.avail = self._compute_avail()

    def _compute_avail(self) -> dict[int, int]:
        avail: dict[int, float] = {g.gid: INF for g in self.memo.all_groups()}
        changed = True
        while changed:
            changed = False
            for g in self.memo.all_groups():
                best = avail[g.gid]
                for e in g.exprs:
                    if e.kind == "scan_snap":
                        v = float(e.payload[1])
                    elif e.kind == "scan_delta":
                        v = float(e.payload[2])
                    elif e.kind == "empty":
                        v = 1.0
                    else:
                        vs = [avail.get(self.memo.find(c), INF) for c in e.children]
                        v = max(vs) if vs else INF
                    if v < best:
                        best = v
                if best < avail[g.gid]:
                    avail[g.gid] = best
                    changed = True
        return {g: (int(v) if v != INF else self.k + 1) for g, v in avail.items()}

    def work(self, e: MExpr) -> float:
        if e not in self._work:
            self._work[e] = C.expr_work(e, self.cards, self.memo, self.stats)
        return self._work[e]

    def card(self, gid: int) -> float:
        return self.cards.get(self.memo.find(gid), INF)

    def key(self, vec):
        return C.scalar_key(vec, self.mode, self.weights)


@dataclass
class Choice:
    expr: MExpr
    children: tuple[tuple[int, int], ...]  # (child gid, exec time)


class Selector:
    """Temporal DP with optional shared (materialized) states.

    Solved by value iteration over the full (group, τ) state table:
    costs are non-negative and the memo graph may contain cycles
    (merge/diff derivations reference each other), so Bellman-style
    relaxation to a fixpoint is both sound and polynomial — a cyclic
    derivation can never beat the acyclic optimum it relaxes from.
    """

    MAX_PASSES = 60

    def __init__(self, ctx: PlanContext, shared: dict[int, int] | None = None):
        self.ctx = ctx
        self.shared = dict(shared or {})
        # (gid, tau) -> (vec, Choice)
        self._best: dict[tuple[int, int], tuple] = {}
        # (gid, tau_use) -> (vec, exec_time)
        self._deliv: dict[tuple[int, int], tuple] = {}
        self._solve()

    def _update_deliv(self, gid: int) -> bool:
        """Recompute delivered-cost entries of one group; True if changed."""
        ctx = self.ctx
        changed = False
        card = ctx.card(gid)
        sh_tau = self.shared.get(gid)
        for tau_use in range(ctx.avail.get(gid, ctx.k + 1), ctx.k + 1):
            best_vec, best_tau = None, None
            if sh_tau is not None and sh_tau <= tau_use:
                best_vec = C.add_at(C.zeros(ctx.k), tau_use, C.LOAD_F * card)
                best_tau = sh_tau
            for tc in range(ctx.avail.get(gid, ctx.k + 1), tau_use + 1):
                v, _ = self._best.get((gid, tc), (None, None))
                if v is None:
                    continue
                if tc < tau_use:
                    v = C.add_at(v, tc, C.SAVE_F * card)
                    v = C.add_at(v, tau_use, C.LOAD_F * card)
                if best_vec is None or ctx.key(v) < ctx.key(best_vec):
                    best_vec, best_tau = v, tc
            old = self._deliv.get((gid, tau_use))
            if best_vec is not None and (
                old is None or ctx.key(best_vec) < ctx.key(old[0])
            ):
                self._deliv[(gid, tau_use)] = (best_vec, best_tau)
                changed = True
        return changed

    def _solve(self) -> None:
        ctx = self.ctx
        groups = [g.gid for g in ctx.memo.all_groups()]
        for _ in range(self.MAX_PASSES):
            changed = False
            for gid in groups:
                lo = ctx.avail.get(gid, ctx.k + 1)
                for tau in range(lo, ctx.k + 1):
                    best = self._best.get((gid, tau))
                    for e in ctx.memo.exprs_of(gid):
                        w = ctx.work(e)
                        if w == INF:
                            continue
                        vec = C.add_at(C.zeros(ctx.k), tau, w)
                        kids = []
                        ok = True
                        for c in e.children:
                            c = ctx.memo.find(c)
                            d = self._deliv.get((c, tau))
                            if d is None:
                                ok = False
                                break
                            vec = C.vec_add(vec, d[0])
                            kids.append((c, d[1]))
                        if not ok:
                            continue
                        if best is None or ctx.key(vec) < ctx.key(best[0]):
                            best = (vec, Choice(e, tuple(kids)))
                            changed = True
                    if best is not None:
                        self._best[(gid, tau)] = best
                if self._update_deliv(gid):
                    changed = True
            if not changed:
                break

    def best(self, gid: int, tau: int):
        """(vec, Choice, clean) — clean kept for API compatibility."""
        gid = self.ctx.memo.find(gid)
        vec, choice = self._best.get((gid, tau), (None, None))
        return vec, choice, True

    def delivered(self, gid: int, tau_use: int):
        gid = self.ctx.memo.find(gid)
        return self._deliv.get((gid, tau_use), (None, None))


# ---------------------------------------------------------------------------
# extraction


@dataclass
class Task:
    gid: int
    time: int
    expr: MExpr
    inputs: tuple[tuple[int, int], ...]  # (gid, exec time) of children

    @property
    def state(self) -> str:
        return f"g{self.gid}@t{self.time}"


@dataclass
class ExtractedPlan:
    tasks: list[Task]  # topological (children first), then by time
    roots: list[tuple[int, int]]
    cost_vec: tuple[float, ...]
    saved_states: set[tuple[int, int]]  # states crossing a time boundary

    def tasks_at(self, i: int) -> list[Task]:
        return [t for t in self.tasks if t.time == i]


def extract(selector: Selector, roots: list[tuple[int, int]]) -> ExtractedPlan:
    ctx = selector.ctx
    tasks: dict[tuple[int, int], Task] = {}
    order: list[tuple[int, int]] = []
    in_progress: set[tuple[int, int]] = set()

    def materialize(gid: int, tau: int) -> None:
        gid = ctx.memo.find(gid)
        key = (gid, tau)
        if key in tasks:
            return
        assert key not in in_progress, f"cyclic plan at {key}"
        in_progress.add(key)
        vec, choice, _ = selector.best(gid, tau)
        assert choice is not None, f"no plan for group {gid} at t{tau}"
        for c, tc in choice.children:
            materialize(c, tc)
        tasks[key] = Task(gid, tau, choice.expr, choice.children)
        order.append(key)
        in_progress.discard(key)

    for g, t in roots:
        materialize(g, t)

    # actual (deduplicated) cost of the extracted graph
    vec = C.zeros(ctx.k)
    loads: set[tuple[int, int, int]] = set()  # (gid, exec, use)
    saved: set[tuple[int, int]] = set()
    for key in order:
        t = tasks[key]
        vec = C.add_at(vec, t.time, ctx.work(t.expr))
        for c, tc in t.inputs:
            if tc < t.time:
                saved.add((c, tc))
                loads.add((c, tc, t.time))
    for g, tc in saved:
        vec = C.add_at(vec, tc, C.SAVE_F * ctx.card(g))
    for g, tc, tu in loads:
        vec = C.add_at(vec, tu, C.LOAD_F * ctx.card(g))

    # sort by time; position in the DFS order keeps children before
    # parents within a time point
    pos = {k: i for i, k in enumerate(order)}
    ordered = sorted(
        (tasks[k] for k in order), key=lambda t: (t.time, pos[(t.gid, t.time)])
    )
    return ExtractedPlan(ordered, list(roots), vec, saved)
