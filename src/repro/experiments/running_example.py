"""E0 — the paper's §2.2 worked example (Fig. 1), reproduced exactly.

The micro dataset is Fig. 1's: sales o1–o4 at t1 (o5–o7 at t2), the
return for o1 at t1 and for o2, o6 at t2. The γ snapshot check
``280 + (-15) = 265`` for category c1 from §3.2 pins the reading of the
figure.

We execute the two fixed pipelines of §2.2 directly on the physical
operators — IM-1 (maintain the outer-join view and the aggregate view)
and IM-2 (inner join early, anti join at completion time) — count the
tuples each run computes in its join and aggregate operators, and score
them with the paper's per-unit prices (0.2 at t1, 1.0 at t2). A
``retractions`` parameter adds late returns records (o4, then o3),
reproducing the paper's observation that retraction flips the winner.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.logical import AggSpec
from repro.incr import ops
from repro.incr.mult import MULT, merge_mult

AGGS = (
    AggSpec("sum", "CASE WHEN r_cost IS NULL THEN price ELSE -r_cost END", "gross"),
)
KEYS = ("cat",)
LK, RK, RCOLS = ("o_id",), ("r_o_id",), ("r_o_id", "r_cost")

W1, W2 = 0.2, 1.0  # the §2.2 per-unit costs


def _mk(spark, rows, cols):
    pdf = pd.DataFrame(rows, columns=list(cols))
    pdf[MULT] = 1
    return spark.createDataFrame(pdf)


def fig1_data(spark: SparkSession, retractions: int = 0):
    """Fig. 1 relations. ``retractions`` in {0,1,2} adds returns for o4
    (and then o3) at t2, retracting their early null-padded outputs."""
    sales_cols = ("o_id", "cat", "price")
    ret_cols = ("r_o_id", "r_cost")
    s1 = _mk(spark, [(1, "c1", 100.0), (2, "c2", 150.0), (3, "c1", 120.0),
                     (4, "c1", 170.0)], sales_cols)
    ds = _mk(spark, [(5, "c2", 300.0), (6, "c1", 150.0), (7, "c2", 220.0)],
             sales_cols)
    r1 = _mk(spark, [(1, 10.0)], ret_cols)
    late = [(2, 20.0), (6, 15.0)]
    if retractions >= 1:
        late.append((4, 25.0))
    if retractions >= 2:
        late.append((3, 30.0))
    dr = _mk(spark, late, ret_cols)
    s2 = merge_mult(s1, ds)
    r2 = merge_mult(r1, dr)
    return s1, ds, s2, r1, dr, r2


def _count(df) -> int:
    return df.count()


def run_im1(spark, retractions: int = 0) -> dict:
    """IM-1: maintain sales_status and summary as always-up-to-date views."""
    s1, ds, s2, r1, dr, r2 = fig1_data(spark, retractions)
    # t1: outer join + aggregate on the data seen so far
    q1 = ops.b_join_louter(s1, r1, LK, RK)
    st1 = ops.b_agg_state(q1, KEYS, AGGS)
    t1 = _count(q1) + _count(st1)
    # t2: delta of the view, delta of the aggregate
    dq = ops.d_join_louter(ds, dr, s1, r1, r2, LK, RK, RCOLS)
    dst = ops.d_agg_state(dq, KEYS, AGGS)
    t2 = _count(dq) + _count(dst)
    final = ops.b_final(ops.merge_state(st1, dst, KEYS), KEYS, AGGS)
    return {"t1": t1, "t2": t2, "cost": W1 * t1 + W2 * t2, "final": final}


def run_im2(spark, retractions: int = 0) -> dict:
    """IM-2: hold back unmatched sales; inner join early, anti join at
    completion time (Eq. 3's Q^P / Q^N decomposition)."""
    s1, ds, s2, r1, dr, r2 = fig1_data(spark, retractions)
    qp1 = ops.b_join_inner(s1, r1, LK, RK)
    stp1 = ops.b_agg_state(qp1, KEYS, AGGS)
    t1 = _count(qp1) + _count(stp1)
    dqp = ops.d_join_inner(ds, r2, s1, dr, LK, RK)
    dstp = ops.d_agg_state(dqp, KEYS, AGGS)
    qn = ops.b_join_anti(s2, r2, LK, RK, pad_cols=RCOLS, pad_template=r2)
    stn = ops.b_agg_state(qn, KEYS, AGGS)
    t2 = _count(dqp) + _count(dstp) + _count(qn) + _count(stn)
    final = ops.b_final(
        ops.merge_state(ops.merge_state(stp1, dstp, KEYS), stn, KEYS), KEYS, AGGS
    )
    return {"t1": t1, "t2": t2, "cost": W1 * t1 + W2 * t2, "final": final}


# the paper's §2.2 numbers for reference in the output table
PAPER = {
    0: {"IM-1": 11.8, "IM-2": 12.2, "winner": "IM-1"},
    1: {"IM-1": 13.8, "IM-2": 12.2, "winner": "IM-2"},
}


def run(spark: SparkSession) -> list[dict]:
    rows = []
    for retr in (0, 1, 2):
        a = run_im1(spark, retr)
        b = run_im2(spark, retr)
        paper = PAPER.get(min(retr, 1), {})
        rows.append({
            "retractions": retr,
            "IM1_t1": a["t1"], "IM1_t2": a["t2"], "IM1_cost": a["cost"],
            "IM2_t1": b["t1"], "IM2_t2": b["t2"], "IM2_cost": b["cost"],
            "winner": "IM-1" if a["cost"] < b["cost"] else "IM-2",
            "paper_IM1": paper.get("IM-1", ""),
            "paper_IM2": paper.get("IM-2", ""),
            "paper_winner": paper.get("winner", ""),
        })
    return rows


def check_fig1_snapshot(spark) -> dict:
    """§3.2's pin: summary snapshot at t2 has gross(c1) = 265 (= 280-15)
    and the t1 snapshot has gross(c1) = 280."""
    s1, ds, s2, r1, dr, r2 = fig1_data(spark, 0)
    g1 = ops.b_final(
        ops.b_agg_state(ops.b_join_louter(s1, r1, LK, RK), KEYS, AGGS), KEYS, AGGS
    )
    g2 = ops.b_final(
        ops.b_agg_state(ops.b_join_louter(s2, r2, LK, RK), KEYS, AGGS), KEYS, AGGS
    )
    m1 = {r["cat"]: r["gross"] for r in g1.collect()}
    m2 = {r["cat"]: r["gross"] for r in g2.collect()}
    return {"t1_c1": m1["c1"], "t2_c1": m2["c1"], "t2_c2": m2["c2"]}
