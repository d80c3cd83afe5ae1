"""Iterative-dataflow helpers."""
import os

import pytest

from repro import spark_util as su


def test_partitions_for():
    assert su.partitions_for(100) == 1
    assert su.partitions_for(100_000) == 4
    assert su.partitions_for(5_000_000) == 16


def test_dfpin_truncates_lineage(gspark):
    import pandas as pd

    df = gspark.createDataFrame(pd.DataFrame({"a": range(10)}))
    pin = su.DFPin()
    for _ in range(5):
        df = pin(df.selectExpr("a + 1 AS a"))
    # lineage is cut each round: the analyzed plan stays shallow
    plan = df._jdf.queryExecution().analyzed().toString()
    assert plan.count("Project") <= 2
    assert df.agg({"a": "sum"}).collect()[0][0] == sum(range(10)) + 50
    pin.release()


def test_no_pin_is_identity(gspark):
    import pandas as pd

    df = gspark.createDataFrame(pd.DataFrame({"a": [1]}))
    assert su.no_pin(df) is df


def test_shuffle_partitions_ctx(gspark):
    before = gspark.conf.get("spark.sql.shuffle.partitions")
    with su.shuffle_partitions(gspark, 2):
        assert gspark.conf.get("spark.sql.shuffle.partitions") == "2"
    assert gspark.conf.get("spark.sql.shuffle.partitions") == before


def test_ensure_session_env_idempotent():
    before = os.environ.get("PYSPARK_SUBMIT_ARGS")
    su.ensure_session_env()
    mid = os.environ.get("PYSPARK_SUBMIT_ARGS")
    su.ensure_session_env()
    assert os.environ.get("PYSPARK_SUBMIT_ARGS") == mid
    assert "spark.local.dir" in mid
    if before is not None:
        os.environ["PYSPARK_SUBMIT_ARGS"] = before
