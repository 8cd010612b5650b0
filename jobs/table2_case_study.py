"""spark-submit entrypoint for Table II (case-study model comparison).

Usage: python jobs/table2_case_study.py [q alpha beta]
Prints the measured statistics of SC / (alpha,beta)-core / bitruss /
biclique / C4star communities around the query user, then the paper's rows.
"""
import sys

import pandas as pd

from repro.experiments import table2
from repro.spark_session import get_session


def main() -> None:
    spark = get_session("table2")
    kwargs = {}
    if len(sys.argv) == 4:
        kwargs = {"q": int(sys.argv[1]), "alpha": int(sys.argv[2]), "beta": int(sys.argv[3])}
    df = table2.run(spark, **kwargs)
    with pd.option_context("display.width", 200, "display.max_columns", 50):
        print("measured (planted ML-comedy-like graph):")
        print(df.to_string(index=False))
        print("\npaper (MovieLens comedy, q=6778, alpha=beta=45):")
        print(table2.PAPER.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
