"""spark-submit entrypoint — Fig 4: vertex/edge imbalance of baselines.

Usage: spark-submit jobs/fig4_imbalance.py
The harness prints the paper's reference rows next to the measured ones;
see EXPERIMENTS.md for the recorded comparison.
"""
from pyspark.sql import SparkSession

from repro.experiments.fig4_balance import main

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("fig4_imbalance")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("WARN")
    main(spark)
    spark.stop()
