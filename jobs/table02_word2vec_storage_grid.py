"""spark-submit entrypoint — Table 2: Word2Vec storage-configuration grid.

Usage: spark-submit jobs/table02_word2vec_storage_grid.py   (or: python jobs/table02_word2vec_storage_grid.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table02"]().render())


if __name__ == "__main__":
    main()
