"""Test-local tuning on top of the provided session ``spark`` fixture."""
import pytest


@pytest.fixture(scope="session", autouse=False)
def spark_small(spark):
    """Session spark with few shuffle partitions — all test data is tiny and
    64 partitions would dominate runtime with scheduling overhead."""
    spark.conf.set("spark.sql.shuffle.partitions", "4")
    return spark
