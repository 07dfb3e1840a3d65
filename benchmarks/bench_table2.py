"""Benchmark + regeneration of Table 2 (worked example state)."""
from benchmarks._bench_common import run_once
from repro.evalx.harness import table2


def test_table2(benchmark, spark):
    out = run_once(benchmark, table2, spark)
    print("\n[table2]\n" + out.to_string(index=False))
    assert len(out) == 15  # 3+3+2+3+2+2 candidates for r1..r6
