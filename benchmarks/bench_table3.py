"""Benchmark + regeneration of Table 3 (dataset analog properties)."""
from benchmarks._bench_common import bench_sf, run_once
from repro.evalx.harness import table3


def test_table3(benchmark):
    out = run_once(benchmark, table3, sf=bench_sf())
    print("\n[table3]\n" + out.to_string(index=False))
    assert len(out) == 12  # 2 + 3 + 2 + 5 dependencies
