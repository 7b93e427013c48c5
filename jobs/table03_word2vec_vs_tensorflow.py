"""spark-submit entrypoint — Table 3: netsDB vs TensorFlow (word2vec).

Usage: spark-submit jobs/table03_word2vec_vs_tensorflow.py   (or: python jobs/table03_word2vec_vs_tensorflow.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table03"]().render())


if __name__ == "__main__":
    main()
