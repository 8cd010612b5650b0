"""spark-submit entrypoint for the Fig 8/10/11-shaped experiment:
per-query time of Q_o / Q_v / Q_opt and index build time/size for
I_v / I_delta / I_bs^alpha / I_bs^beta.

Usage: python jobs/fig8_query_index.py [DATASET]
"""
import sys

import pandas as pd

from repro.experiments import fig8
from repro.spark_session import get_session


def main() -> None:
    spark = get_session("fig8")
    dataset = sys.argv[1] if len(sys.argv) > 1 else "GH"
    idx_df, query_df = fig8.run(spark, dataset=dataset)
    with pd.option_context("display.width", 200, "display.max_columns", 50):
        print("index construction:")
        print(idx_df.to_string(index=False))
        print("\nquery performance:")
        print(query_df.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
