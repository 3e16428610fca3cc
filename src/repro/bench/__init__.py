"""Benchmark queries, workloads and the timing harness (§8)."""
