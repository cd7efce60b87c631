"""Distributed-TPA scalability table (DESIGN.md TS): SparkTPA preprocess and
online time across growing DCSBM graphs, plus the O(m)-per-iteration check.

    spark-submit jobs/spark_scale.py
"""
from pyspark.sql import SparkSession

from repro.experiments.cli import print_df
from repro.experiments.spark_scale import spark_scale_table

if __name__ == "__main__":
    spark = (
        SparkSession.builder.appName("tpa-spark-scale")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    try:
        print_df(spark_scale_table(spark), "TS — distributed TPA scalability")
    finally:
        spark.stop()
