"""Table 2: the paper's worked candidate-generation example (Figure 3).

Usage: spark-submit jobs/table2.py
"""
from _common import session

from repro.evalx.harness import table2


def main() -> None:
    spark = session("sparcle-table2")
    out = table2(spark)
    print(out.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
