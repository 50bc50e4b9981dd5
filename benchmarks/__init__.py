"""Benchmark package (one module per paper table + scaling)."""
