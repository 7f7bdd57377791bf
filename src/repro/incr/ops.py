"""Physical operators over multiplicity-bags (batch and delta forms).

Batch ops compute operator snapshots from input snapshots; delta ops
implement the paper's TVR-generating rules (delta queries) per operator,
exact under arbitrary +/- deltas:

* inner join:  Δ(L⋈R) = ΔL⋈R' +# L⋈ΔR                 (bilinear identity)
* left-outer / semi join: per-key match-count transitions — a key whose
  right-side count crosses 0→>0 retracts its null-padded rows, >0→0
  re-inserts them (Griffin-Kumar style, bag semantics).
* aggregate: attribute-perspective states (running SUM / COUNT per
  group), linear in multiplicity, merged with ``+γ`` (Initialize /
  Iterate / Merge / Final of [51]).
* OJV (Larson-Zhou): ΔQ^D via delta join, ΔQ^I retract computed against
  the *previous query snapshot* (the paper's Eq. 4b) — same result as
  the direct delta rule via a costlier route, which is exactly OJV's
  cost profile.

Snapshots fed to batch joins must be normalized (mult >= 1); deltas may
mix signs. Join keys are assumed non-null (true for all workload
schemas; aggregate-result keys are group-bys of non-null base keys).
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame, functions as F

from repro.core.logical import AggSpec
from repro.incr.mult import MULT, consolidate, merge_mult, negate

CNT = "__cnt__"  # per-group total multiplicity (empty-group filter)


# ---------------------------------------------------------------------------
# generic helpers


def _renamed(df: DataFrame, suffix: str) -> DataFrame:
    return df.withColumnRenamed(MULT, MULT + suffix)


def _key_cond(l: DataFrame, r: DataFrame, lkeys, rkeys) -> Column:
    cond = F.lit(True)
    for lk, rk in zip(lkeys, rkeys):
        cond = cond & (l[lk] == r[rk])
    return cond


def _against_keys(
    df: DataFrame, dkeys, keys_df: DataFrame, kcols, how: str, extra=()
) -> DataFrame:
    """Join ``df`` against a derived key set, breaking lineage by renaming
    the key frame's columns (Spark flags self-join ambiguity otherwise).
    ``extra`` columns of ``keys_df`` are carried through unrenamed."""
    sel = [F.col(c).alias(f"__jk{i}__") for i, c in enumerate(kcols)]
    sel += [F.col(c) for c in extra]
    k2 = keys_df.select(*sel)
    cond = F.lit(True)
    for i, dk in enumerate(dkeys):
        cond = cond & (df[dk] == k2[f"__jk{i}__"])
    out = df.join(k2, cond, how)
    if how == "inner":
        out = out.drop(*[f"__jk{i}__" for i in range(len(kcols))])
    return out


def _pad_nulls(df: DataFrame, rcols, template: DataFrame) -> DataFrame:
    """Append null right-side columns (typed from ``template``) to df."""
    tt = dict(template.dtypes)
    out = df
    for c in rcols:
        out = out.withColumn(c, F.lit(None).cast(tt[c]))
    return out


def _match_counts(r_old: DataFrame, dr: DataFrame, rkeys) -> DataFrame:
    """Per-key right-side multiplicity before (o) and after (n) a delta."""
    o = r_old.groupBy(*rkeys).agg(F.sum(MULT).alias("o")).withColumn("n_add", F.lit(0).cast("long"))
    d = dr.groupBy(*rkeys).agg(F.sum(MULT).alias("n_add")).withColumn("o", F.lit(0).cast("long"))
    both = o.unionByName(d.select(*rkeys, "o", "n_add"))
    return both.groupBy(*rkeys).agg(
        F.sum("o").alias("o"), (F.sum("o") + F.sum("n_add")).alias("n")
    )


# ---------------------------------------------------------------------------
# batch (snapshot-space) operators


def b_filter(df: DataFrame, pred: str) -> DataFrame:
    return df.filter(F.expr(pred))


def b_project(df: DataFrame, exprs) -> DataFrame:
    return df.select(*[F.expr(e).alias(a) for a, e in exprs], F.col(MULT))


def b_union(dfs) -> DataFrame:
    out = dfs[0]
    for d in dfs[1:]:
        out = out.unionByName(d)
    return out


def b_join_inner(l: DataFrame, r: DataFrame, lkeys, rkeys) -> DataFrame:
    la, ra = _renamed(l, "_l"), _renamed(r, "_r")
    j = la.join(ra, _key_cond(la, ra, lkeys, rkeys), "inner")
    return j.withColumn(MULT, F.col(MULT + "_l") * F.col(MULT + "_r")).drop(
        MULT + "_l", MULT + "_r"
    )


def b_join_louter(l: DataFrame, r: DataFrame, lkeys, rkeys) -> DataFrame:
    la, ra = _renamed(l, "_l"), _renamed(r, "_r")
    j = la.join(ra, _key_cond(la, ra, lkeys, rkeys), "left_outer")
    return j.withColumn(
        MULT,
        F.when(F.col(MULT + "_r").isNull(), F.col(MULT + "_l")).otherwise(
            F.col(MULT + "_l") * F.col(MULT + "_r")
        ),
    ).drop(MULT + "_l", MULT + "_r")


def _matched_keys(r: DataFrame, rkeys) -> DataFrame:
    """Distinct right-side keys with positive total multiplicity."""
    return (
        r.groupBy(*rkeys)
        .agg(F.sum(MULT).alias("__c__"))
        .filter(F.col("__c__") > 0)
        .select(*rkeys)
    )


def b_join_semi(l: DataFrame, r: DataFrame, lkeys, rkeys) -> DataFrame:
    return _against_keys(l, lkeys, _matched_keys(r, rkeys), rkeys, "left_semi")


def b_join_anti(
    l: DataFrame, r: DataFrame, lkeys, rkeys, pad_cols=(), pad_template=None
) -> DataFrame:
    out = _against_keys(l, lkeys, _matched_keys(r, rkeys), rkeys, "left_anti")
    if pad_cols:
        out = _pad_nulls(out, pad_cols, pad_template)
        out = out.select(*[c for c in out.columns if c != MULT], MULT)
    return out


def _state_cols(aggs: tuple[AggSpec, ...]) -> list[str]:
    cols = []
    for a in aggs:
        if a.func == "count":
            cols.append(f"c_{a.alias}")
        elif a.func == "sum":
            cols.append(f"s_{a.alias}")
        else:  # avg
            cols += [f"s_{a.alias}", f"n_{a.alias}"]
    return cols + [CNT]


def b_agg_state(df: DataFrame, keys, aggs: tuple[AggSpec, ...]) -> DataFrame:
    """Initialize+Iterate: aggregate-state snapshot (attribute perspective)."""
    m = F.col(MULT)
    exprs = []
    for a in aggs:
        if a.func == "count":
            exprs.append(F.sum(m).alias(f"c_{a.alias}"))
        else:
            s = F.sum(m * F.coalesce(F.expr(a.expr), F.lit(0))).alias(f"s_{a.alias}")
            exprs.append(s)
            if a.func == "avg":
                exprs.append(F.sum(m).alias(f"n_{a.alias}"))
    exprs.append(F.sum(m).alias(CNT))
    return df.groupBy(*keys).agg(*exprs)


def merge_state(a: DataFrame, b: DataFrame, keys) -> DataFrame:
    """The ``+γ`` merge: sum states per group (null-safe via group-by)."""
    cols = [c for c in a.columns if c not in keys]
    u = a.unionByName(b)
    return u.groupBy(*keys).agg(*[F.sum(c).alias(c) for c in cols])


def negate_state(a: DataFrame, keys) -> DataFrame:
    cols = [c for c in a.columns if c not in keys]
    out = a
    for c in cols:
        out = out.withColumn(c, -F.col(c))
    return out


def diff_state(a: DataFrame, b: DataFrame, keys) -> DataFrame:
    """The ``-γ`` inverse: a -γ b, so b +γ (a -γ b) = a."""
    return merge_state(a, negate_state(b, keys), keys)


def b_final(state: DataFrame, keys, aggs: tuple[AggSpec, ...]) -> DataFrame:
    """Final: state -> multiplicity-perspective result (drops empty groups)."""
    out = state.filter(F.col(CNT) > 0)
    sel = list(keys)
    for a in aggs:
        if a.func == "count":
            sel.append(F.col(f"c_{a.alias}").alias(a.alias))
        elif a.func == "sum":
            sel.append(F.col(f"s_{a.alias}").alias(a.alias))
        else:
            sel.append(
                (F.col(f"s_{a.alias}") * F.lit(1.0) / F.col(f"n_{a.alias}")).alias(a.alias)
            )
    return out.select(*sel).withColumn(MULT, F.lit(1).cast("long"))


# ---------------------------------------------------------------------------
# delta (TVR-generating) operators


def d_join_inner(
    dl: DataFrame, r_new: DataFrame, l_old: DataFrame, dr: DataFrame, lkeys, rkeys
) -> DataFrame:
    part1 = b_join_inner(dl, r_new, lkeys, rkeys)
    part2 = b_join_inner(l_old, dr, lkeys, rkeys)
    return consolidate(part1.unionByName(part2))


def d_join_louter(
    dl: DataFrame,
    dr: DataFrame,
    l_old: DataFrame,
    r_old: DataFrame,
    r_new: DataFrame,
    lkeys,
    rkeys,
    rcols,
) -> DataFrame:
    """IM-1 delta of a left-outer join (rule (1) of Fig. 3(a), [26])."""
    inner = d_join_inner(dl, r_new, l_old, dr, lkeys, rkeys)
    cnts = _match_counts(r_old, dr, rkeys)
    # ΔL rows whose key is unmatched in R' -> padded, original mult
    nk = cnts.filter(F.col("n") > 0).select(*rkeys)
    anti_add = _pad_nulls(
        _against_keys(dl, lkeys, nk, rkeys, "left_anti"), rcols, r_new
    )
    # keys whose matchedness flipped: 0→>0 retracts padded rows of L,
    # >0→0 re-inserts them
    trans = cnts.filter(
        ((F.col("o") > 0) & (F.col("n") <= 0)) | ((F.col("o") <= 0) & (F.col("n") > 0))
    ).withColumn("__dir__", F.when(F.col("o") > 0, F.lit(1)).otherwise(F.lit(-1)))
    tk = trans.select(*rkeys, "__dir__")
    tr = _against_keys(l_old, lkeys, tk, rkeys, "inner", extra=["__dir__"])
    tr = tr.withColumn(MULT, F.col(MULT) * F.col("__dir__")).drop("__dir__")
    tr = _pad_nulls(tr.select(*l_old.columns), rcols, r_new)
    cols = inner.columns
    return consolidate(
        inner.unionByName(anti_add.select(*cols)).unionByName(tr.select(*cols))
    )


def d_join_semi(
    dl: DataFrame, dr: DataFrame, l_old: DataFrame, r_old: DataFrame, lkeys, rkeys
) -> DataFrame:
    cnts = _match_counts(r_old, dr, rkeys)
    nk = cnts.filter(F.col("n") > 0).select(*rkeys)
    add = _against_keys(dl, lkeys, nk, rkeys, "left_semi")
    trans = cnts.filter(
        ((F.col("o") > 0) & (F.col("n") <= 0)) | ((F.col("o") <= 0) & (F.col("n") > 0))
    ).withColumn("__dir__", F.when(F.col("o") > 0, F.lit(-1)).otherwise(F.lit(1)))
    tk = trans.select(*rkeys, "__dir__")
    tr = _against_keys(l_old, lkeys, tk, rkeys, "inner", extra=["__dir__"])
    tr = tr.withColumn(MULT, F.col(MULT) * F.col("__dir__")).select(*l_old.columns)
    return consolidate(add.unionByName(tr))


def d_agg_state(delta: DataFrame, keys, aggs) -> DataFrame:
    """Aggregate-state delta: states are linear in multiplicity."""
    return b_agg_state(delta, keys, aggs)


def state_to_mult_delta(
    state_old: DataFrame, state_delta: DataFrame, keys, aggs
) -> DataFrame:
    """Convert an attribute-perspective delta to a multiplicity one.

    Retract the old Final rows of the affected groups, emit the new
    ones — the intra-TVR perspective conversion that lets joins sit
    above aggregates (the q10/q35 shape).
    """
    affected = state_delta.select(*keys).distinct()
    old_part = _against_keys(state_old, keys, affected, keys, "left_semi")
    new_part = merge_state(old_part, state_delta, keys)
    return merge_mult(
        negate(b_final(old_part, keys, aggs)), b_final(new_part, keys, aggs)
    )


def ojv_delta_louter(
    dl: DataFrame,
    dr: DataFrame,
    l_old: DataFrame,
    r_old: DataFrame,
    r_new: DataFrame,
    q_prev: DataFrame,
    lkeys,
    rkeys,
    rcols,
) -> DataFrame:
    """Larson-Zhou outer-join view maintenance (Eq. 4a/4b), one input at
    a time via a virtual time point: first ΔR against L, then ΔL.

    ΔQ^D = L ⋈ ΔR; ΔQ^I retracts the null-padded rows *of the previous
    view snapshot* ``q_prev`` whose keys became matched (and re-pads from
    L for keys that lost their last match); finally ΔL ⟕ R'.
    """
    dqd = b_join_inner(l_old, dr, lkeys, rkeys)
    cnts = _match_counts(r_old, dr, rkeys)
    # keys 0→>0: retract padded rows from the previous snapshot (Eq. 4b)
    newly = cnts.filter((F.col("o") <= 0) & (F.col("n") > 0)).select(*rkeys)
    null_pred = F.lit(False)
    for c in rcols:
        null_pred = null_pred | F.col(c).isNotNull()
    padded_prev = q_prev.filter(~null_pred)
    retract = negate(_against_keys(padded_prev, lkeys, newly, rkeys, "left_semi"))
    # keys >0→0: the padded rows come back (from the base relation L)
    gone = cnts.filter((F.col("o") > 0) & (F.col("n") <= 0)).select(*rkeys)
    back = _pad_nulls(
        _against_keys(l_old, lkeys, gone, rkeys, "left_semi"), rcols, r_new
    )
    # ΔL applied against the updated R
    dl_part = b_join_louter(dl, r_new, lkeys, rkeys)
    cols = dl_part.columns
    return consolidate(
        dqd.select(*cols)
        .unionByName(retract.select(*cols))
        .unionByName(back.select(*cols))
        .unionByName(dl_part)
    )
