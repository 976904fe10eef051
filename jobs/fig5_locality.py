"""spark-submit entrypoint — Fig 5: edge locality on public graphs.

Usage: spark-submit jobs/fig5_locality.py
The harness prints the paper's reference rows next to the measured ones;
see EXPERIMENTS.md for the recorded comparison.
"""
from pyspark.sql import SparkSession

from repro.experiments.fig5_locality import main

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("fig5_locality")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("WARN")
    main(spark)
    spark.stop()
