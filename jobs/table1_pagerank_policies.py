"""spark-submit entrypoint — Table 1: PR runtime/communication by partitioning policy.

Usage: spark-submit jobs/table1_pagerank_policies.py
The harness prints the paper's reference rows next to the measured ones;
see EXPERIMENTS.md for the recorded comparison.
"""
from pyspark.sql import SparkSession

from repro.experiments.table1 import main

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("table1_pagerank_policies")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("WARN")
    main(spark)
    spark.stop()
