"""Benchmark helpers.

Each paper table gets one pytest-benchmark target that runs its harness
builder once (``pedantic(rounds=1)``: a full cleaning run is minutes, not
microseconds — the benchmark records wall-clock, it does not sample).
``REPRO_BENCH_SF`` scales record counts (1.0 = default bench scale).
"""
import os


def bench_sf() -> float:
    return float(os.environ.get("REPRO_BENCH_SF", "1.0"))


def run_once(benchmark, fn, *args, **kwargs):
    return benchmark.pedantic(fn, args=args, kwargs=kwargs, rounds=1, iterations=1)
