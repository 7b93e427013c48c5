"""spark-submit entrypoint — Table 6: text classification storage grid.

Usage: spark-submit jobs/table06_textclf_storage_grid.py   (or: python jobs/table06_textclf_storage_grid.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table06"]().render())


if __name__ == "__main__":
    main()
