"""Benchmark scale factors.

Planner-only benches (E1–E3, E8–E12) use SF_PLAN statistics; executed
benches (E0, E4–E7) run Spark at SF_EXEC to keep single-machine wall
time reasonable — work metrics are rows-based and scale linearly, so
relative comparisons are unaffected.
"""
SF_PLAN = 0.1
SF_EXEC = 0.02
