"""Tempura core: logical algebra, TIP-model memo, TVR rewrite rules,
plan-space exploration, temporal-DP plan selection, and MQO state
materialization."""
