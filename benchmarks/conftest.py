"""Benchmark fixtures — same session tuning as the test suite."""
from repro.spark_util import ensure_session_env

ensure_session_env()

import pytest  # noqa: E402

from repro.spark_util import tune_runtime  # noqa: E402


@pytest.fixture(scope="session")
def gspark(spark):
    tune_runtime(spark, 4)
    return spark
