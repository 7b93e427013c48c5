"""spark-submit entrypoint — Table 10: accuracy drop per dedup method.

Usage: spark-submit jobs/table10_accuracy_drops.py   (or: python jobs/table10_accuracy_drops.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table10"]().render())


if __name__ == "__main__":
    main()
