"""Benchmark harnesses — one module per evaluation table of the paper."""
