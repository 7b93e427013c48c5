"""spark-submit entrypoint — Table 13: online packing reuse.

Usage: spark-submit jobs/table13_online_packing.py   (or: python jobs/table13_online_packing.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table13"]().render())


if __name__ == "__main__":
    main()
