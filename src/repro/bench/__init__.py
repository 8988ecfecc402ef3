"""Benchmark harnesses: one function per evaluation-section table, plus
time/memory measurement utilities."""
