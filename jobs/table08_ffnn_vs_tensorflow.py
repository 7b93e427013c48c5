"""spark-submit entrypoint — Table 8: netsDB vs TensorFlow (FFNN).

Usage: spark-submit jobs/table08_ffnn_vs_tensorflow.py   (or: python jobs/table08_ffnn_vs_tensorflow.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["table08"]().render())


if __name__ == "__main__":
    main()
