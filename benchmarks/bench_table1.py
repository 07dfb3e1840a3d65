"""Benchmark + regeneration of Table 1 (NYC borough repair-rate split)."""
from benchmarks._bench_common import bench_sf, run_once
from repro.evalx.harness import table1


def test_table1(benchmark, spark):
    out = run_once(benchmark, table1, spark, sf=bench_sf())
    print("\n[table1]\n" + out.to_string(index=False))
    assert len(out) == 2
    sp = out[out["system"] == "sparcle_n2"].iloc[0]
    hc = out[out["system"] == "holoclean"].iloc[0]
    # The paper's headline: Sparcle repairs new-location errors, the host
    # system mostly cannot.
    assert sp["errors_at_new_location"] > hc["errors_at_new_location"]
