"""Workloads: TPC-H-lite queries, DS pipelines, array workloads, and the
Table III/IV registries."""
