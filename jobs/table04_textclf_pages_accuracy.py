"""spark-submit entrypoint — Table 4: text classification pages + accuracy.

Usage: spark-submit jobs/table04_textclf_pages_accuracy.py   (or: python jobs/table04_textclf_pages_accuracy.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table04"]().render())


if __name__ == "__main__":
    main()
