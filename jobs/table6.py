"""Table 6: wall-clock per dataset and system.

Usage: spark-submit jobs/table6.py [sf]
"""
from _common import session, sf_arg

from repro.evalx.harness import table6


def main() -> None:
    spark = session("sparcle-table6")
    out = table6(spark, sf=sf_arg())
    print(out.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
