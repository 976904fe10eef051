"""spark-submit entrypoint — Fig 8: fixed step length sweep.

Usage: spark-submit jobs/fig8_step_size.py
The harness prints the paper's reference rows next to the measured ones;
see EXPERIMENTS.md for the recorded comparison.
"""
from pyspark.sql import SparkSession

from repro.experiments.fig8_step import main

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("fig8_step_size")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("WARN")
    main(spark)
    spark.stop()
