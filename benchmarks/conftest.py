"""Benchmark fixtures: reuse the session SparkSession from the root
conftest with low shuffle parallelism (indexes are small and cached)."""
import pytest


@pytest.fixture(scope="session")
def sparkb(spark):
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    spark.sparkContext.setLogLevel("ERROR")
    return spark
