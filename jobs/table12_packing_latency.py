"""spark-submit entrypoint — Table 12: packing latency.

Usage: spark-submit jobs/table12_packing_latency.py   (or: python jobs/table12_packing_latency.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table12"]().render())


if __name__ == "__main__":
    main()
