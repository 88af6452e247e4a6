"""Test-level Spark tuning: tiny inputs want tiny shuffle fan-out."""
import pytest


@pytest.fixture(autouse=True)
def _small_shuffles(request):
    """Drop shuffle partitions for unit-scale graphs (runtime-settable)."""
    if "spark" in request.fixturenames:
        spark = request.getfixturevalue("spark")
        spark.conf.set("spark.sql.shuffle.partitions", "4")
    yield
