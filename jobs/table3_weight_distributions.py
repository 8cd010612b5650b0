"""spark-submit entrypoint for Table III (SCS runtime by weight distribution).

Usage: python jobs/table3_weight_distributions.py [n_queries]
Times SCS-Baseline / SCS-Peel / SCS-Expand on the DT-like dataset under
AE / RW / UF / SK weights, and prints the paper's Table III next to it.
"""
import sys

import pandas as pd

from repro.experiments import table3
from repro.spark_session import get_session


def main() -> None:
    spark = get_session("table3")
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 3
    df = table3.run(spark, n_queries=n)
    with pd.option_context("display.width", 200, "display.max_columns", 50):
        print("measured (DT-like synthetic, seconds):")
        print(df.to_string(index=False))
        print("\npaper (DT, seconds):")
        print(table3.PAPER.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
