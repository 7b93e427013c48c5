"""spark-submit entrypoint — Table 14: compression technique interplay.

Usage: spark-submit jobs/table14_compression.py   (or: python jobs/table14_compression.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table14"]().render())


if __name__ == "__main__":
    main()
