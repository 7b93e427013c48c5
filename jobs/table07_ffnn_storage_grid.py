"""spark-submit entrypoint — Table 7: FFNN transfer-learning storage grid.

Usage: spark-submit jobs/table07_ffnn_storage_grid.py   (or: python jobs/table07_ffnn_storage_grid.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table07"]().render())


if __name__ == "__main__":
    main()
