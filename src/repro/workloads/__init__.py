"""Workloads: Table 1 queries, randomized query generators, multi-query workloads."""
