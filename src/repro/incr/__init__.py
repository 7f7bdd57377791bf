"""Incremental execution substrate: multiplicity-bag algebra, physical
operators (batch and delta forms), and the incremental-plan executor."""
