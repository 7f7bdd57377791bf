"""Experiment harnesses — one per table/figure-panel of the paper's
evaluation (§8). Each harness returns rows (list of dicts) and the
`report.fmt_table` helper renders them; benchmarks and jobs print the
tables that EXPERIMENTS.md compares against the paper."""
