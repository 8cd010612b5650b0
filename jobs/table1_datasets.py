"""spark-submit entrypoint for Table I (dataset summary).

Usage: python jobs/table1_datasets.py [DATASET ...]
Prints measured |E|, |U|, |L|, delta, alpha_max, beta_max, |R_dd| per
synthetic dataset next to the paper's Table I values.
"""
import sys

import pandas as pd

from repro.experiments import table1
from repro.spark_session import get_session


def main() -> None:
    spark = get_session("table1")
    names = sys.argv[1:] or None
    df = table1.run(spark, names=names)
    with pd.option_context("display.width", 200, "display.max_columns", 50):
        print(df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
