"""spark-submit entrypoint — Fig 7: Giraph app speedups over Hash.

Usage: spark-submit jobs/fig7_speedups.py
The harness prints the paper's reference rows next to the measured ones;
see EXPERIMENTS.md for the recorded comparison.
"""
from pyspark.sql import SparkSession

from repro.experiments.fig7_speedup import main

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("fig7_speedups")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("WARN")
    main(spark)
    spark.stop()
