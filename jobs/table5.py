"""Table 5: accuracy per attribute on Chicago-Synthetic (distinct values).

Usage: spark-submit jobs/table5.py [sf]
"""
from _common import session, sf_arg

from repro.evalx.harness import table5


def main() -> None:
    spark = session("sparcle-table5")
    out = table5(spark, sf=sf_arg())
    print(out.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
