"""Planner-visible statistics.

The paper estimates per-time-point cardinalities from historical arrival
patterns (§7); here the :class:`StatsProvider` reads exact snapshot /
delta row counts from an :class:`ArrivalScenario` (the "accurate
estimation" setting) — or from a *different* scenario than the one being
executed (the Fig. 7(g) inaccurate-estimation setting).

NDV (number of distinct values) per column is computed once from the
generator database; column names are globally unique across the
TPC-DS-lite schema, so a flat column->ndv map suffices for join and
group-by selectivity.
"""
from __future__ import annotations

from typing import Optional


class StatsProvider:
    def __init__(self, scenario, source=None):
        """``scenario`` is executed; ``source`` (default: same) provides
        the counts the planner sees."""
        self.scenario = scenario
        self.source = source or scenario
        self._ndv: dict[str, int] = {}
        for pdf in self.source.db.values():
            for c in pdf.columns:
                self._ndv[c] = max(1, int(pdf[c].nunique()))
        self._rows_cache: dict[tuple, int] = {}

    @property
    def k(self) -> int:
        return self.source.k

    def rows(self, table: str, kind: str, i: int) -> int:
        key = (table, kind, i)
        if key not in self._rows_cache:
            self._rows_cache[key] = self.source.rows(table, kind, i)
        return self._rows_cache[key]

    def ndv(self, col: str) -> Optional[int]:
        return self._ndv.get(col)
