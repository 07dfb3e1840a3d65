"""Table 3: measured properties of the generated dataset analogs.

Usage: python jobs/table3.py [sf]   (no Spark needed)
"""
from _common import sf_arg

from repro.evalx.harness import table3


def main() -> None:
    print(table3(sf=sf_arg()).to_string(index=False))


if __name__ == "__main__":
    main()
