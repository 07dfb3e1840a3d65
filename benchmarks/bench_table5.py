"""Benchmark + regeneration of Table 5 (accuracy vs distinct values)."""
from benchmarks._bench_common import bench_sf, run_once
from repro.evalx.harness import table5


def test_table5(benchmark, spark):
    out = run_once(benchmark, table5, spark, sf=bench_sf())
    print("\n[table5]\n" + out.to_string(index=False))
    piv = out.set_index(["attribute", "system"])["f1"]
    for attr in ("district", "ward", "zipcode", "beat", "census"):
        assert piv[(attr, "sparcle_n2")] > piv[(attr, "holoclean")]
