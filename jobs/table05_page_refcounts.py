"""spark-submit entrypoint — Table 5: page reference-count distribution.

Usage: spark-submit jobs/table05_page_refcounts.py   (or: python jobs/table05_page_refcounts.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table05"]().render())


if __name__ == "__main__":
    main()
