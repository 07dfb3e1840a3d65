"""Figure 5 as a table: d × n parameter sweep fixing Sparcle's defaults.

Usage: spark-submit jobs/param_sweep.py [sf]
"""
from _common import session, sf_arg

from repro.evalx.harness import param_sweep


def main() -> None:
    spark = session("sparcle-param-sweep")
    out = param_sweep(spark, sf=sf_arg())
    print(out.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
