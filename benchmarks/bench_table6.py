"""Benchmark + regeneration of Table 6 (running time per system)."""
from benchmarks._bench_common import bench_sf, run_once
from repro.evalx.harness import table6


def test_table6(benchmark, spark):
    out = run_once(benchmark, table6, spark, sf=bench_sf())
    print("\n[table6]\n" + out.to_string(index=False))
    assert set(out["dataset"]) == {"austin", "chicago", "nyc"}
    assert (out["elapsed_s"] > 0).all()
