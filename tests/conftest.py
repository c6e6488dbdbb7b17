"""Test-local fixtures layered on the session ``spark`` fixture."""
import pytest


@pytest.fixture
def spark_small_shuffle(spark):
    """The iterative graph loops (k-core / CC) run dozens of tiny stages;
    64 shuffle partitions is pure scheduling overhead at test scale, so
    dial down for the duration of a test. AQE still applies."""
    old = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    yield spark
    spark.conf.set("spark.sql.shuffle.partitions", old)
