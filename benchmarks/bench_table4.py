"""Benchmark + regeneration of Table 4 (accuracy on real-data analogs)."""
from benchmarks._bench_common import bench_sf, run_once
from repro.evalx.harness import table4


def test_table4(benchmark, spark):
    out = run_once(benchmark, table4, spark, sf=bench_sf())
    print("\n[table4]\n" + out.to_string(index=False))
    piv = out[out["attribute"] == "Overall"].set_index(["dataset", "system"])["f1"]
    for ds in ("austin", "chicago", "nyc"):
        assert piv[(ds, "sparcle_n2")] > piv[(ds, "holoclean")]
