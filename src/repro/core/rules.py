"""TVR rewrite rules (§4) and incremental-method configurations (§8.1).

Rule trichotomy, mirrored from the paper:

* **TVR-generating rules** (`derive_deltas`): per-operator delta queries
  — Δ of filter/project/union, delta inner join (bilinear), delta
  left-outer / left-semi join (match-count transitions, the Fig. 3(a)
  rules of [26]), attribute-perspective aggregate deltas.
* **Intra-TVR rules** (`derive_merges`, `derive_diffs`): ``+#`` / ``+γ``
  merges of a snapshot with its consecutive delta (left-deep order under
  GE; arbitrary delta spans without GE), and the inverse-difference
  rules (PNA skips them when a generated delta already exists).
* **Inter-TVR rules**: `im2_pass` (Q^P/Q^N decomposition, Eq. 3),
  `ojv_pass` handled inline via the ``ojv_delta`` expression (Eq. 4),
  `hov_pass` (higher-order pre-aggregated complement views, Eq. 5).

Methods are rule subsets (`MethodConfig`), as in the paper's §8.1 where
each method is simulated by switching off the other methods' rules.
"""
from __future__ import annotations

import re
from dataclasses import dataclass

from repro.core import logical as L
from repro.core.memo import MExpr, Memo, delta, snap

EMPTY = -1  # sentinel tvr id: the empty TVR (Q^N of base tables)


@dataclass(frozen=True)
class MethodConfig:
    """Which rule families are active (one per §8.1 incremental method)."""

    name: str
    dgen_louter: bool  # direct delta rules for left-outer / left-semi join
    im2: bool
    ojv: bool
    hov: bool
    hov_exclusive: bool = False  # HOV-only: drop the non-rewritten agg delta


IM1 = MethodConfig("IM1", True, False, False, False)
IM2 = MethodConfig("IM2", False, True, False, False)
OJV = MethodConfig("OJV", False, False, True, False)
HOV = MethodConfig("HOV", True, False, False, True, hov_exclusive=True)
ALL = MethodConfig("ALL", True, True, True, True)

METHODS = {m.name: m for m in (IM1, IM2, OJV, HOV, ALL)}


def combo(names: tuple[str, ...]) -> MethodConfig:
    """Cumulative method combination (the Fig. 8(e)(f) experiment)."""
    s = set(names)
    return MethodConfig(
        "+".join(names),
        dgen_louter="IM1" in s or "HOV" in s,
        im2="IM2" in s,
        ojv="OJV" in s,
        hov="HOV" in s,
    )


class RuleContext:
    """Shared state of one exploration run."""

    def __init__(self, memo: Memo, k: int, schemas, cfg: MethodConfig, speedups):
        self.memo = memo
        self.k = k
        self.schemas = schemas
        self.cfg = cfg
        self.speedups = set(speedups)
        self.bodies: dict[int, list[L.Plan]] = {}
        self.hov_rewritten: set[int] = set()
        self.attempts = 0  # rule-pattern match attempts (instrumentation)

    def tvr(self, node: L.Plan) -> int:
        tid = self.memo.tvr_for_node(node)
        self.bodies.setdefault(tid, [node] if isinstance(node, L.Plan) else [])
        return tid

    def sg(self, tid: int, i: int, p: str = "mult"):
        return self.memo.group_of(tid, snap(i, p))

    def dg(self, tid: int, i: int, j: int | None = None, p: str = "mult"):
        return self.memo.group_of(tid, delta(i, j if j else i + 1, p))


# ---------------------------------------------------------------------------
# seeding


def seed_scans(ctx: RuleContext, plan: L.Plan) -> None:
    """Register base-table snapshots/deltas and trivial Q^P/Q^N links."""
    for t in sorted(L.base_tables(plan)):
        tid = ctx.tvr(L.Scan(t))
        for i in range(1, ctx.k + 1):
            ctx.memo.register(tid, snap(i), MExpr("scan_snap", (t, i), ()))
        for i in range(1, ctx.k):
            ctx.memo.register(
                tid, delta(i, i + 1), MExpr("scan_delta", (t, i, i + 1), ())
            )
        ctx.memo.link(tid, "qp", tid)
        ctx.memo.link(tid, "qn", EMPTY)


def ensure_tvrs(ctx: RuleContext, node: L.Plan) -> int:
    """Recursively create TVRs for a (possibly new) plan subtree."""
    if isinstance(node, L.Scan):
        return ctx.tvr(node)
    if isinstance(node, (L.Filter, L.Project, L.Aggregate)):
        ensure_tvrs(ctx, node.child)
    elif isinstance(node, L.Join):
        ensure_tvrs(ctx, node.left)
        ensure_tvrs(ctx, node.right)
    elif isinstance(node, L.Union):
        for c in node.children:
            ensure_tvrs(ctx, c)
    return ctx.tvr(node)


# ---------------------------------------------------------------------------
# snapshot ("querying a TVR", Def. 3) and TVR-generating rules


def _delta_range(ctx: RuleContext, restricted: bool):
    return range(1, 2 if restricted else ctx.k)


def derive_body(ctx: RuleContext, tid: int, node: L.Plan, restricted: bool) -> None:
    """Fire snapshot + delta derivations of one defining body of ``tid``."""
    m, k = ctx.memo, ctx.k
    if isinstance(node, L.Scan):
        return
    if isinstance(node, (L.Filter, L.Project)):
        ctid = ctx.tvr(node.child)
        kind = "filter" if isinstance(node, L.Filter) else "project"
        payload = (
            (node.pred, node.sel) if isinstance(node, L.Filter) else (node.exprs,)
        )
        for i in range(1, k + 1):
            ctx.attempts += 1
            c = ctx.sg(ctid, i)
            if c is not None:
                m.register(tid, snap(i), MExpr(kind, payload, (c,)))
        for i in _delta_range(ctx, restricted):
            ctx.attempts += 1
            dc = ctx.dg(ctid, i)
            if dc is not None:
                m.register(tid, delta(i, i + 1), MExpr(kind, payload, (dc,)))
        return
    if isinstance(node, L.Union):
        ctids = [ctx.tvr(c) for c in node.children]
        for i in range(1, k + 1):
            ctx.attempts += 1
            cs = [ctx.sg(c, i) for c in ctids]
            if all(c is not None for c in cs):
                m.register(tid, snap(i), MExpr("union", (), tuple(cs)))
        for i in _delta_range(ctx, restricted):
            ctx.attempts += 1
            ds = [ctx.dg(c, i) for c in ctids]
            if all(d is not None for d in ds):
                m.register(tid, delta(i, i + 1), MExpr("union", (), tuple(ds)))
        return
    if isinstance(node, L.Join):
        ltid, rtid = ctx.tvr(node.left), ctx.tvr(node.right)
        rcols = (
            L.output_cols(node.right, ctx.schemas)
            if node.how in ("left_outer", "left_anti_pad")
            else ()
        )
        payload = (node.how, node.lkeys, node.rkeys, rcols)
        for i in range(1, k + 1):
            ctx.attempts += 1
            l, r = ctx.sg(ltid, i), ctx.sg(rtid, i)
            if l is not None and r is not None:
                m.register(tid, snap(i), MExpr("join", payload, (l, r)))
        for i in _delta_range(ctx, restricted):
            ctx.attempts += 1
            dl, dr = ctx.dg(ltid, i), ctx.dg(rtid, i)
            lo, ro = ctx.sg(ltid, i), ctx.sg(rtid, i)
            rn = ctx.sg(rtid, i + 1)
            if None in (dl, dr, lo, ro, rn):
                continue
            if node.how == "inner":
                m.register(
                    tid,
                    delta(i, i + 1),
                    MExpr("d_join_inner", (node.lkeys, node.rkeys), (dl, rn, lo, dr)),
                )
            elif node.how == "left_outer":
                if ctx.cfg.dgen_louter:
                    m.register(
                        tid,
                        delta(i, i + 1),
                        MExpr(
                            "d_join_louter",
                            (node.lkeys, node.rkeys, rcols),
                            (dl, dr, lo, ro, rn),
                        ),
                    )
                if ctx.cfg.ojv:
                    qprev = ctx.sg(tid, i)
                    if qprev is not None:
                        m.register(
                            tid,
                            delta(i, i + 1),
                            MExpr(
                                "ojv_delta",
                                (node.lkeys, node.rkeys, rcols),
                                (dl, dr, lo, ro, rn, qprev),
                            ),
                        )
            elif node.how == "left_semi" and ctx.cfg.dgen_louter:
                m.register(
                    tid,
                    delta(i, i + 1),
                    MExpr("d_join_semi", (node.lkeys, node.rkeys), (dl, dr, lo, ro)),
                )
            # left_anti / left_anti_pad: no generating rule (IM-2 holds
            # the N-part back to output times)
        return
    if isinstance(node, L.Aggregate):
        ctid = ctx.tvr(node.child)
        payload = (node.keys, node.aggs)
        for i in range(1, k + 1):
            ctx.attempts += 1
            c = ctx.sg(ctid, i)
            if c is not None:
                m.register(tid, snap(i, "state"), MExpr("agg_state", payload, (c,)))
            st = ctx.sg(tid, i, "state")
            if st is not None:
                m.register(tid, snap(i), MExpr("final", payload, (st,)))
        skip = (
            ctx.cfg.hov_exclusive
            and tid in ctx.hov_rewritten
            and node == ctx.memo.tvrs[tid].node
        )
        for i in _delta_range(ctx, restricted):
            ctx.attempts += 1
            if not skip:
                dc = ctx.dg(ctid, i)
                if dc is not None:
                    m.register(
                        tid,
                        delta(i, i + 1, "state"),
                        MExpr("d_agg_state", payload, (dc,)),
                    )
            st = ctx.sg(tid, i, "state")
            dst = ctx.dg(tid, i, p="state")
            if st is not None and dst is not None:
                m.register(
                    tid, delta(i, i + 1), MExpr("s2m_delta", payload, (st, dst))
                )
        return
    raise TypeError(node)


# ---------------------------------------------------------------------------
# intra-TVR rules


def _state_keys(ctx: RuleContext, tid: int):
    node = ctx.memo.tvrs[tid].node
    return node.keys if isinstance(node, L.Aggregate) else ()


def derive_merges(ctx: RuleContext, tid: int, restricted: bool) -> None:
    m = ctx.memo
    tvr = m.tvrs[tid]
    persps = {inst[-1] for inst in tvr.instants}
    ge = "GE" in ctx.speedups
    for p in persps:
        kind = "merge_mult" if p == "mult" else "merge_state"
        payload = () if p == "mult" else (_state_keys(ctx, tid),)
        if ge:
            for i in _delta_range(ctx, restricted):
                ctx.attempts += 1
                s, d = ctx.sg(tid, i, p), ctx.dg(tid, i, p=p)
                if s is not None and d is not None:
                    m.register(tid, snap(i + 1, p), MExpr(kind, payload, (s, d)))
        else:
            # unguided: merge any snapshot with any adjacent delta span,
            # and chain delta spans (combinatorial — the Baseline of
            # Fig. 8(g))
            spans = [
                (inst[1], inst[2])
                for inst in list(tvr.instants)
                if inst[0] == "delta" and inst[-1] == p
            ]
            for i, j in spans:
                ctx.attempts += 1
                s = ctx.sg(tid, i, p)
                if s is not None:
                    m.register(
                        tid,
                        snap(j, p),
                        MExpr(kind, payload, (s, m.group_of(tid, delta(i, j, p)),)),
                    )
                for j2, j3 in spans:
                    if j2 == j:
                        ctx.attempts += 1
                        a = m.group_of(tid, delta(i, j, p))
                        b = m.group_of(tid, delta(j2, j3, p))
                        m.register(
                            tid, delta(i, j3, p), MExpr(kind, payload, (a, b))
                        )


def derive_diffs(ctx: RuleContext, tid: int, restricted: bool) -> None:
    """Inverse rules: snapshot difference -> delta. PNA defers/skips them
    whenever a TVR-generating delta already exists (§5.4)."""
    m = ctx.memo
    tvr = m.tvrs[tid]
    persps = {inst[-1] for inst in tvr.instants}
    pna = "PNA" in ctx.speedups
    for p in persps:
        kind = "diff_mult" if p == "mult" else "diff_state"
        payload = () if p == "mult" else (_state_keys(ctx, tid),)
        for i in _delta_range(ctx, restricted):
            ctx.attempts += 1
            inst = delta(i, i + 1, p)
            if pna and m.group_of(tid, inst) is not None:
                continue
            s1, s2 = ctx.sg(tid, i, p), ctx.sg(tid, i + 1, p)
            if s1 is not None and s2 is not None:
                m.register(tid, inst, MExpr(kind, payload, (s2, s1)))


# ---------------------------------------------------------------------------
# inter-TVR rules: IM-2 (Q^P / Q^N decomposition)


def _links(ctx: RuleContext, tid: int):
    t = ctx.memo.tvrs[tid]
    return t.links.get("qp"), t.links.get("qn")


def im2_propagate(ctx: RuleContext, tid: int) -> None:
    """Set qp/qn links for one TVR if its children's links allow it."""
    m = ctx.memo
    node = m.tvrs[tid].node
    if not isinstance(node, L.Plan) or isinstance(node, L.Scan):
        return
    qp0, qn0 = _links(ctx, tid)
    if qp0 is not None:
        return
    ctx.attempts += 1

    def node_of(t):
        return m.tvrs[t].node

    if isinstance(node, (L.Filter, L.Project, L.Aggregate)):
        cqp, cqn = _links(ctx, ctx.tvr(node.child))
        if cqp is None:
            return
        if isinstance(node, L.Filter):
            mk = lambda c: L.Filter(c, node.pred, node.sel)
        elif isinstance(node, L.Project):
            mk = lambda c: L.Project(c, node.exprs)
        else:
            mk = lambda c: L.Aggregate(c, node.keys, node.aggs)
        qp_t = ensure_tvrs(ctx, mk(node_of(cqp)))
        qn_t = EMPTY if cqn == EMPTY else ensure_tvrs(ctx, mk(node_of(cqn)))
        m.link(tid, "qp", qp_t)
        m.link(tid, "qn", qn_t)
        return
    if isinstance(node, L.Union):
        ls = [_links(ctx, ctx.tvr(c)) for c in node.children]
        if any(qp is None for qp, _ in ls):
            return
        qps = tuple(node_of(qp) for qp, _ in ls)
        qp_t = ensure_tvrs(ctx, L.Union(qps) if len(qps) > 1 else qps[0])
        qns = tuple(node_of(qn) for _, qn in ls if qn != EMPTY)
        if not qns:
            qn_t = EMPTY
        else:
            qn_t = ensure_tvrs(ctx, L.Union(qns) if len(qns) > 1 else qns[0])
        m.link(tid, "qp", qp_t)
        m.link(tid, "qn", qn_t)
        return
    if isinstance(node, L.Join):
        # every join kind here is linear in its left input, so
        # (Q^P_L +# Q^N_L) <join> R distributes; the right side must be
        # append-safe (empty Q^N), as in Eq. 3.
        lqp, lqn = _links(ctx, ctx.tvr(node.left))
        rqp, rqn = _links(ctx, ctx.tvr(node.right))
        if lqp is None or rqp is None or rqn != EMPTY:
            return

        def jn(l, how):
            return L.Join(l, node.right, how, node.lkeys, node.rkeys)

        if node.how == "left_outer":
            qp_node = jn(node_of(lqp), "inner")
            anti = jn(node_of(lqp), "left_anti_pad")
            if lqn == EMPTY:
                qn_node = anti
            else:
                qn_node = L.Union((anti, jn(node_of(lqn), "left_outer")))
            qn_t = ensure_tvrs(ctx, qn_node)
        else:
            qp_node = jn(node_of(lqp), node.how)
            qn_t = (
                EMPTY if lqn == EMPTY else ensure_tvrs(ctx, jn(node_of(lqn), node.how))
            )
        m.link(tid, "qp", ensure_tvrs(ctx, qp_node))
        m.link(tid, "qn", qn_t)
        return


def im2_assemble(ctx: RuleContext, tid: int) -> None:
    """Register Q_t = Q^P_t +# Q^N_t (and the +γ form for aggregates)."""
    m = ctx.memo
    qp, qn = _links(ctx, tid)
    if qp is None or qp == tid or qn in (None, EMPTY):
        return
    node = m.tvrs[tid].node
    for i in range(1, ctx.k + 1):
        ctx.attempts += 1
        p, n = ctx.sg(qp, i), ctx.sg(qn, i)
        if p is not None and n is not None:
            m.register(tid, snap(i), MExpr("merge_mult", (), (p, n)))
        if isinstance(node, L.Aggregate):
            ps, ns = ctx.sg(qp, i, "state"), ctx.sg(qn, i, "state")
            if ps is not None and ns is not None:
                m.register(
                    tid,
                    snap(i, "state"),
                    MExpr("merge_state", (node.keys,), (ps, ns)),
                )


# ---------------------------------------------------------------------------
# inter-TVR rules: HOV (higher-order pre-aggregated complement views)


def _refs_any(expr: str, cols: set[str]) -> bool:
    toks = set(re.findall(r"[A-Za-z_][A-Za-z0-9_]*", expr))
    return bool(toks & cols)


def hov_rewrite(ctx: RuleContext, tid: int) -> None:
    """Rewrite γ(L ⋈ R) into γ'(L ⟕ M) with M = γ_{key}(R) maintained as
    a higher-order view (the paper's Eq. 5 example). Registers the
    rewritten aggregate as an additional defining body of the same TVR."""
    node = ctx.memo.tvrs[tid].node
    if tid in ctx.hov_rewritten or not isinstance(node, L.Aggregate):
        return
    j = node.child
    if not isinstance(j, L.Join) or j.how not in ("inner", "left_outer"):
        return
    ctx.attempts += 1
    left_cols = set(L.output_cols(j.left, ctx.schemas))
    if not set(node.keys) <= left_cols:
        return
    right_cols = set(L.output_cols(j.right, ctx.schemas))
    aggs: list[L.AggSpec] = []
    for a in node.aggs:
        # declared splits encode left-outer semantics (__mc__ NULL =
        # unmatched left row kept); they are not valid over inner joins
        if a.func == "count" or (
            a.func == "sum" and a.hov_split is not None and j.how == "left_outer"
        ):
            aggs.append(a)
            continue
        # auto-split: a SUM whose measure references no right-side
        # column contributes measure × match-count per left row
        if a.func == "sum" and not _refs_any(a.expr, right_cols):
            fallback = "1" if j.how == "left_outer" else "0"
            aggs.append(
                L.AggSpec(
                    "sum",
                    a.expr,
                    a.alias,
                    hov_split=("0", f"({a.expr}) * COALESCE(__mc__, {fallback})"),
                )
            )
            continue
        return  # AVG / unsplittable measure: HOV not applicable
    node = L.Aggregate(node.child, node.keys, tuple(aggs))
    m_aggs = [
        L.AggSpec("sum", a.hov_split[0], f"__m_{a.alias}__")
        for a in node.aggs
        if a.func == "sum"
    ] + [L.AggSpec("count", "", "__mc__")]
    m_node = L.Aggregate(j.right, j.rkeys, tuple(m_aggs))
    h_node = L.Join(j.left, m_node, "left_outer", j.lkeys, j.rkeys)
    new_aggs = []
    for a in node.aggs:
        if a.func == "count":
            fallback = "1" if j.how == "left_outer" else "0"
            new_aggs.append(
                L.AggSpec("sum", f"COALESCE(__mc__, {fallback})", a.alias)
            )
        else:
            combined = a.hov_split[1].replace("__m__", f"__m_{a.alias}__")
            new_aggs.append(L.AggSpec("sum", combined, a.alias))
    a2 = L.Aggregate(h_node, node.keys, tuple(new_aggs))
    ensure_tvrs(ctx, h_node)
    ctx.bodies[tid].append(a2)
    ctx.hov_rewritten.add(tid)
