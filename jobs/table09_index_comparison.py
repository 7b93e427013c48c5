"""spark-submit entrypoint — Table 9: index compression + query time.

Usage: spark-submit jobs/table09_index_comparison.py   (or: python jobs/table09_index_comparison.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table09"]().render())


if __name__ == "__main__":
    main()
