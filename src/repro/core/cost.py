"""Cost model: per-operator work estimates and the paper's time-point
cost functions (§6.2).

* ``c̃_w`` — weighted sum over time points (PDW-PD; early runs cheap).
* ``c̃_v`` — per-time vector compared in *reverse lexical* order
  (IVM-PD; minimize the latest run's cost first).

Costs are vectors of length k (one entry per time point); an operator
executed at ``t_τ`` contributes its work to entry ``τ``. Work is a
rows-processed proxy: ``IN_W·Σ input cards + OUT_W·output card``.
Inputs are weighted below 1 because a delivered input has already been
materialized by its producer (or priced through Save/Load); outputs are
weighted up because they are shuffled/pipelined downstream. Save/Load
of a state across a time boundary costs ``SAVE_F/LOAD_F × rows`` (§6.1).

Cardinalities are estimated per memo group by fixpoint relaxation over
the (possibly cyclic — merge/diff) memo graph.
"""
from __future__ import annotations

import math

from repro.core.memo import MExpr, Memo
from repro.core.stats import StatsProvider

SAVE_F = 0.4
LOAD_F = 0.2
IN_W = 0.3
OUT_W = 2.0

INF = math.inf


def _ndv_or(stats: StatsProvider, col: str, fallback: float) -> float:
    n = stats.ndv(col)
    return float(n) if n else fallback


def _join_card(stats, l, r, lkeys, rkeys) -> float:
    if l == 0 or r == 0:
        return 0.0
    denom = 1.0
    for lk, rk in zip(lkeys, rkeys):
        denom = max(denom, max(_ndv_or(stats, lk, l), _ndv_or(stats, rk, r)))
    return l * r / denom


def _cov(stats, l, r, lkeys, rkeys) -> float:
    """Fraction of the left key domain covered by the right side
    (semi-join selectivity): |dom(rk)| / |dom(lk)|."""
    ndl, ndr = stats.ndv(lkeys[0]), stats.ndv(rkeys[0])
    if ndl and ndr:
        return min(1.0, ndr / ndl)
    return min(1.0, r / max(l, 1.0))


def _group_card(stats, c, keys) -> float:
    nd = 1.0
    known = False
    for k in keys:
        n = stats.ndv(k)
        if n:
            nd *= n
            known = True
    return min(c, nd) if known else c


def expr_card(e: MExpr, ch: list[float], stats: StatsProvider) -> float:
    """Estimated output cardinality of expression ``e`` given child cards."""
    k = e.kind
    if k == "scan_snap":
        return float(stats.rows(e.payload[0], "snap", e.payload[1]))
    if k == "scan_delta":
        return float(stats.rows(e.payload[0], "delta", e.payload[2]))
    if k == "empty":
        return 0.0
    if k == "filter":
        return e.payload[1] * ch[0]
    if k in ("project", "final"):
        return ch[0]
    if k == "union":
        return sum(ch)
    if k == "join":
        how, lkeys, rkeys, _ = e.payload
        l, r = ch
        if how == "inner":
            return _join_card(stats, l, r, lkeys, rkeys)
        if how == "left_outer":
            return max(l, _join_card(stats, l, r, lkeys, rkeys))
        if how == "left_semi":
            return l * _cov(stats, l, r, lkeys, rkeys)
        # left_anti / left_anti_pad
        return l * max(0.05, 1.0 - _cov(stats, l, r, lkeys, rkeys))
    if k == "d_join_inner":
        lkeys, rkeys = e.payload
        dl, r_new, l_old, dr = ch
        return _join_card(stats, dl, r_new, lkeys, rkeys) + _join_card(
            stats, l_old, dr, lkeys, rkeys
        )
    if k == "d_join_louter":
        lkeys, rkeys, _ = e.payload
        dl, dr, l_old, r_old, r_new = ch
        inner = _join_card(stats, dl, r_new, lkeys, rkeys) + _join_card(
            stats, l_old, dr, lkeys, rkeys
        )
        trans = min(l_old, dr * (l_old / max(1.0, _ndv_or(stats, lkeys[0], l_old))))
        return inner + dl + 2 * trans
    if k == "d_join_semi":
        lkeys, rkeys = e.payload
        dl, dr, l_old, r_old = ch
        trans = min(l_old, dr * (l_old / max(1.0, _ndv_or(stats, lkeys[0], l_old))))
        return dl + 2 * trans
    if k == "ojv_delta":
        lkeys, rkeys, _ = e.payload
        dl, dr, l_old, r_old, r_new, q_prev = ch
        inner = _join_card(stats, l_old, dr, lkeys, rkeys)
        trans = min(q_prev, dr * (q_prev / max(1.0, _ndv_or(stats, lkeys[0], q_prev))))
        return inner + max(dl, _join_card(stats, dl, r_new, lkeys, rkeys)) + 2 * trans
    if k in ("agg_state", "d_agg_state"):
        keys, _ = e.payload
        return _group_card(stats, ch[0], keys)
    if k == "s2m_delta":
        return 2.0 * ch[1]
    if k in ("merge_mult", "merge_state", "diff_mult", "diff_state"):
        return sum(ch)
    raise ValueError(f"unknown expr kind {k}")


def estimate_cards(memo: Memo, stats: StatsProvider) -> dict[int, float]:
    """Per-group output-cardinality estimates (fixpoint over the memo)."""
    cards: dict[int, float] = {g.gid: INF for g in memo.all_groups()}
    changed = True
    while changed:
        changed = False
        for g in memo.all_groups():
            best = cards[g.gid]
            for e in g.exprs:
                ch = [cards.get(memo.find(c), INF) for c in e.children]
                if any(c == INF for c in ch):
                    continue
                v = expr_card(e, ch, stats)
                if v < best - 1e-9:
                    best = v
            if best < cards[g.gid] - 1e-9:
                cards[g.gid] = best
                changed = True
    return cards


def expr_work(e: MExpr, cards: dict[int, float], memo: Memo, stats) -> float:
    """Rows-processed work of executing ``e`` once (time-independent)."""
    ch = [cards.get(memo.find(c), INF) for c in e.children]
    if any(c == INF for c in ch):
        return INF
    out = expr_card(e, ch, stats)
    if e.kind.startswith("scan_"):
        return out  # plain read: no shuffle, no downstream-weighted output
    return IN_W * sum(ch) + OUT_W * out


# -- cost-vector helpers ------------------------------------------------------


def zeros(k: int) -> tuple[float, ...]:
    return (0.0,) * k


def add_at(vec: tuple[float, ...], tau: int, amount: float) -> tuple[float, ...]:
    """Add ``amount`` at time index ``tau`` (1-based)."""
    return tuple(v + (amount if i == tau - 1 else 0.0) for i, v in enumerate(vec))


def vec_add(a: tuple[float, ...], b: tuple[float, ...]) -> tuple[float, ...]:
    return tuple(x + y for x, y in zip(a, b))


def scalar_key(vec: tuple[float, ...], mode: str, weights) -> tuple | float:
    """Comparison key: smaller is better.

    ``weighted`` -> w·c (c̃_w); ``vector`` -> reverse-lexical tuple (c̃_v).
    """
    if mode == "weighted":
        return sum(w * v for w, v in zip(weights, vec))
    return tuple(reversed(vec))


def weighted_total(vec: tuple[float, ...], weights) -> float:
    return sum(w * v for w, v in zip(weights, vec))
