"""spark-submit entrypoint — Fig 11: distributed GD scalability.

Usage: spark-submit jobs/fig11_scalability.py
The harness prints the paper's reference rows next to the measured ones;
see EXPERIMENTS.md for the recorded comparison.
"""
from pyspark.sql import SparkSession

from repro.experiments.fig11_scaling import main

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("fig11_scalability")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("WARN")
    main(spark)
    spark.stop()
