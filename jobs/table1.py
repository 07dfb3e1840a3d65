"""Table 1: NYC borough repair rates (total / duplicated / new location).

Usage: spark-submit jobs/table1.py [sf]
"""
from _common import session, sf_arg

from repro.evalx.harness import table1


def main() -> None:
    spark = session("sparcle-table1")
    out = table1(spark, sf=sf_arg())
    print(out.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
