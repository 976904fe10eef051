"""spark-submit entrypoint — Fig 9: adaptive step + vertex fixing traces.

Usage: spark-submit jobs/fig9_adaptive.py
The harness prints the paper's reference rows next to the measured ones;
see EXPERIMENTS.md for the recorded comparison.
"""
from pyspark.sql import SparkSession

from repro.experiments.fig9_adaptive import main

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("fig9_adaptive")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("WARN")
    main(spark)
    spark.stop()
