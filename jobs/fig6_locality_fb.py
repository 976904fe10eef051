"""spark-submit entrypoint — Fig 6: edge locality on fb_lite graphs.

Usage: spark-submit jobs/fig6_locality_fb.py
The harness prints the paper's reference rows next to the measured ones;
see EXPERIMENTS.md for the recorded comparison.
"""
from pyspark.sql import SparkSession

from repro.experiments.fig6_locality_fb import main

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("fig6_locality_fb")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("WARN")
    main(spark)
    spark.stop()
