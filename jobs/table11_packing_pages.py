"""spark-submit entrypoint — Table 11: pages by packing algorithm.

Usage: spark-submit jobs/table11_packing_pages.py   (or: python jobs/table11_packing_pages.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table11"]().render())


if __name__ == "__main__":
    main()
