"""spark-submit entrypoint — Table 1: Word2Vec serving latency vs #models.

Usage: spark-submit jobs/table01_word2vec_latency.py   (or: python jobs/table01_word2vec_latency.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table01"]().render())


if __name__ == "__main__":
    main()
