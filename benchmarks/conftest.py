"""Benchmark-local settings: each experiment is seconds-to-minutes long, so
every benchmark runs exactly once (pedantic rounds=1) — wall-clock numbers,
not microbenchmarks."""
