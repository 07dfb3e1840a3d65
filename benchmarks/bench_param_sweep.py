"""Benchmark + regeneration of the Figure-5 parameter sweep table."""
from benchmarks._bench_common import bench_sf, run_once
from repro.evalx.harness import param_sweep


def test_param_sweep(benchmark, spark):
    out = run_once(benchmark, param_sweep, spark, sf=bench_sf())
    print("\n[param_sweep]\n" + out.to_string(index=False))
    # Distance weighting on (n=2) should not lose to the n=0 ablation at
    # the paper's operating point d=1000.
    piv = out.set_index(["d_m", "n_exp"])["f1"]
    assert piv[(1000.0, 2.0)] >= piv[(1000.0, 0.0)] - 0.02
