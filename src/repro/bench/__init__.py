"""Benchmark harness: one entrypoint per results table (DESIGN.md §3)."""
