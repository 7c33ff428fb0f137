"""spark-submit entrypoint reproducing Table I (dataset statistics).

Usage: spark-submit jobs/table1.py [--scale 1.0]
"""
import argparse

from pyspark.sql import SparkSession

from repro.harness.table1 import PAPER_TABLE1, run_table1


def main(spark: SparkSession, scale: float):
    measured = run_table1(spark, scale=scale)
    print("== Paper Table I ==")
    print(PAPER_TABLE1.to_string(index=False))
    print("\n== Measured (synthetic stand-ins) ==")
    print(measured.to_string(index=False))
    return measured


if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    args = ap.parse_args()
    spark = SparkSession.builder.config("spark.sql.execution.arrow.pyspark.enabled", "true").appName("table1").getOrCreate()
    main(spark, args.scale)
    spark.stop()
