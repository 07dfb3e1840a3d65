"""Table 4: accuracy on the Austin/Chicago/NYC analogs, all systems.

Usage: spark-submit jobs/table4.py [sf]
"""
from _common import session, sf_arg

from repro.evalx.harness import table4


def main() -> None:
    spark = session("sparcle-table4")
    out = table4(spark, sf=sf_arg())
    print(out.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
