"""spark-submit entrypoint — Fig 10: projection method comparison.

Usage: spark-submit jobs/fig10_projections.py
The harness prints the paper's reference rows next to the measured ones;
see EXPERIMENTS.md for the recorded comparison.
"""
from pyspark.sql import SparkSession

from repro.experiments.fig10_projection import main

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("fig10_projections")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("WARN")
    main(spark)
    spark.stop()
