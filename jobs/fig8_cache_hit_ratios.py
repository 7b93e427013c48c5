"""spark-submit entrypoint — Fig. 8 companion: cache hit ratios by policy.

Usage: spark-submit jobs/fig8_cache_hit_ratios.py   (or: python jobs/fig8_cache_hit_ratios.py)
Prints the paper-vs-measured markdown table to stdout.
"""
from repro.experiments.tables import ALL_TABLES


def main() -> None:
    print(ALL_TABLES["fig8"]().render())


if __name__ == "__main__":
    main()
