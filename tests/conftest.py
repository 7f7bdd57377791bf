import pytest


@pytest.fixture(scope="session", autouse=True)
def _small_shuffle(spark):
    """Tiny inputs: 64 shuffle partitions would dominate runtime."""
    old = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", "4")
    yield
    spark.conf.set("spark.sql.shuffle.partitions", old)
