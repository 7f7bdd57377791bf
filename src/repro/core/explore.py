"""Plan-space exploration (§5): fire TVR rewrite rules to a fixpoint.

The engine repeatedly sweeps every TVR's defining bodies with the
derivation rules until the memo stops changing (saturation). Inter-TVR
passes (IM-2 decomposition, HOV rewrites) create new TVRs/bodies that
the next sweep picks up.

Speed-ups (§5.4), toggled via ``speedups``:

* ``TS``  — translational symmetry: saturate delta structures for the
  first (snapshot, delta) pair only, then replay over the remaining
  time points on the already-built structure (fewer matching sweeps).
* ``PNA`` — skip inverse-difference rules when a generated delta exists.
* ``GE``  — guided exploration: left-deep merge order only (no
  delta-span chaining).

All toggles produce the same *useful* plan space; Baseline (none of
them) registers strictly more alternatives and sweeps more, which is
what Fig. 8(g) measures.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from repro.core import logical as L
from repro.core import rules as R
from repro.core.memo import Memo


@dataclass
class ExploreResult:
    memo: Memo
    root_tid: int
    seconds: float
    passes: int
    attempts: int
    memo_stats: dict = field(default_factory=dict)


def explore(
    query: L.Plan,
    k: int,
    schemas: dict[str, tuple[str, ...]],
    cfg: R.MethodConfig = R.ALL,
    speedups=("TS", "PNA", "GE"),
) -> ExploreResult:
    t0 = time.perf_counter()
    memo = Memo()
    ctx = R.RuleContext(memo, k, schemas, cfg, speedups)
    root_tid = R.ensure_tvrs(ctx, query)
    R.seed_scans(ctx, query)

    def sweep(restricted: bool) -> None:
        # snapshot of tvr ids: inter-TVR passes extend the list mid-sweep
        for tid in range(len(memo.tvrs)):
            node = memo.tvrs[tid].node
            if not isinstance(node, L.Plan):
                continue
            # inter-TVR rules fire first (the boosted-priority scoring of
            # §5.3) — HOV exclusivity requires the rewrite to land before
            # the aggregate's own delta derivation
            if cfg.hov:
                R.hov_rewrite(ctx, tid)
            if cfg.im2:
                R.im2_propagate(ctx, tid)
                R.im2_assemble(ctx, tid)
            for body in list(ctx.bodies.get(tid, [])):
                R.derive_body(ctx, tid, body, restricted)
            R.derive_merges(ctx, tid, restricted)
        # inverse rules last (PNA gives them the lowest priority)
        for tid in range(len(memo.tvrs)):
            if isinstance(memo.tvrs[tid].node, L.Plan):
                R.derive_diffs(ctx, tid, restricted)

    passes = 0

    def saturate(restricted: bool) -> None:
        nonlocal passes
        while True:
            v0 = memo.version
            sweep(restricted)
            passes += 1
            if memo.version == v0:
                break

    if "TS" in set(speedups) and k > 2:
        saturate(restricted=True)  # one (snapshot, delta) pair
        saturate(restricted=False)  # translate across the timeline
    else:
        saturate(restricted=False)

    return ExploreResult(
        memo,
        root_tid,
        time.perf_counter() - t0,
        passes,
        ctx.attempts,
        memo.stats(),
    )
