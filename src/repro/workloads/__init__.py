"""Workloads: data-arrival scenarios, query suites, and the synthetic
progressive-data-warehouse workloads W-A / W-B."""
