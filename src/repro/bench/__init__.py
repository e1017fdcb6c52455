"""Benchmark workloads, timing harness, and per-table drivers."""
