"""E7 — progressive data warehouse case study (§8.3, Fig. 6(e)(f),
Fig. 7(h)(i)).

TDW: each workload query planned and executed as a single batch run at
the final time (24:00). PDW: Tempura's incremental plan over three runs
(14:00, 19:00, 24:00) with resource-cost weights (0.25, 0.3, 1.0) —
the paper's spot-instance-style tiered rates. Both are *executed* on
Spark and scored with the measured rows-work.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.core.stats import StatsProvider
from repro.core.tempura import IQPProblem, Tempura
from repro.incr.executor import release, run_plan
from repro.workloads.arrival import make_scenario
from repro.workloads.warehouse import workload

K = 3
WEIGHTS = (0.25, 0.3, 1.0)
TIMES = ("14:00", "19:00", "24:00")
# batch-forcing weights: early execution priced out, so the DP puts the
# whole (cheapest batch) plan at the last run — a traditional optimizer
_TDW_WEIGHTS = (1e9, 1e9, 1.0)


def _problem(q, stats, weights) -> IQPProblem:
    return IQPProblem(q, stats, K, (K,), "weighted", weights)


def run_case_study(
    spark: SparkSession,
    name: str,
    sf: float = 0.01,
    seed: int | None = None,
    queries: list | None = None,
) -> tuple[list[dict], dict]:
    scenario = make_scenario(spark, "delta-big", k=K, sf=sf)
    stats = StatsProvider(scenario)
    rows = []
    for qid, q in (queries if queries is not None else workload(name, seed)):
        tdw_res = Tempura("IM1", run_mqo=False).optimize(
            _problem(q, stats, _TDW_WEIGHTS)
        )
        tdw_rep = run_plan(spark, scenario, tdw_res.plan, K)
        tdw = tdw_rep.work_vec[K - 1]
        release(tdw_rep)

        pdw_res = Tempura("ALL").optimize(_problem(q, stats, WEIGHTS))
        pdw_rep = run_plan(spark, scenario, pdw_res.plan, K)
        pdw_w = pdw_rep.weighted(WEIGHTS)
        rows.append({
            "query": qid,
            "tdw": tdw,
            "pdw_weighted": pdw_w,
            "ratio": pdw_w / tdw if tdw else 1.0,
            "pdw_t1": pdw_rep.work_vec[0],
            "pdw_t2": pdw_rep.work_vec[1],
            "pdw_t3": pdw_rep.work_vec[2],
            "ratio_2400": (pdw_rep.work_vec[2] / tdw) if tdw else 1.0,
            "pdw_abs_total": pdw_rep.total_work,
        })
        release(pdw_rep)
    scenario.release()

    n = len(rows)
    ratios = sorted(r["ratio"] for r in rows)
    r24 = sorted(r["ratio_2400"] for r in rows)
    tot_tdw = sum(r["tdw"] for r in rows)
    tot_pdw = sum(r["pdw_weighted"] for r in rows)
    tot_abs = sum(r["pdw_abs_total"] for r in rows)
    summary = {
        "workload": name,
        "queries": n,
        "pct_improved": 100.0 * sum(r < 1.0 for r in ratios) / n,
        "pct_cut_over_35": 100.0 * sum(r < 0.65 for r in ratios) / n,
        "total_reduction_pct": 100.0 * (1 - tot_pdw / tot_tdw),
        "pct_2400_reduced": 100.0 * sum(r < 1.0 for r in r24) / n,
        "pct_2400_cut_over_25": 100.0 * sum(r < 0.75 for r in r24) / n,
        "pdw_overhead_pct": 100.0 * (tot_abs / tot_tdw - 1),
        "tdw_total": tot_tdw,
        "pdw_weighted_total": tot_pdw,
        "pdw_t1_total": sum(r["pdw_t1"] for r in rows),
        "pdw_t2_total": sum(r["pdw_t2"] for r in rows),
        "pdw_t3_total": sum(r["pdw_t3"] for r in rows),
    }
    return rows, summary
