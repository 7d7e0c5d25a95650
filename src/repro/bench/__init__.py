"""Benchmark harness that regenerates the paper's evaluation tables."""
