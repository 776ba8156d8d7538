"""Benchmark fixtures: small shuffle partitions for tiny iteration state."""
import pytest


@pytest.fixture(scope="session", autouse=True)
def _tune(spark):
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    spark.sparkContext.setLogLevel("ERROR")
    yield
