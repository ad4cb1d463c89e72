"""Self-tests for the DuckDB oracle and the bench harness."""
import numpy as np
import pandas as pd
import pytest

from repro.bench_util import Point, format_table, points_to_markdown, run_point
from repro.mpc.accounting import Meter, SimulatedOOM
from repro.oracle import assert_equivalent


def test_oracle_accepts_matching_result(spark):
    pdf = pd.DataFrame({"k": [1, 2, 2], "v": [10, 20, 30]})
    df = spark.createDataFrame(pdf).groupBy("k").sum("v").withColumnRenamed(
        "sum(v)", "s"
    )
    assert_equivalent(df, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_rejects_wrong_rows(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [10, 20]})
    df = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "s": [10, 99]}))
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_rejects_column_mismatch(spark):
    pdf = pd.DataFrame({"k": [1]})
    df = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT k FROM t", t=pdf)


def test_oracle_ignores_row_and_column_order(spark):
    pdf = pd.DataFrame({"a": [1, 2], "b": [3, 4]})
    df = spark.createDataFrame(pd.DataFrame({"b": [4, 3], "a": [2, 1]}))
    assert_equivalent(df, "SELECT a, b FROM t", t=pdf)


def test_oracle_accepts_spark_frames_as_tables(spark):
    pdf = pd.DataFrame({"x": [1, 2, 3]})
    sdf = spark.createDataFrame(pdf)
    out = sdf.agg({"x": "sum"}).withColumnRenamed("sum(x)", "s")
    assert_equivalent(out, "SELECT SUM(x) AS s FROM t", t=sdf)


# ------------------------------------------------------------ bench_util
def test_run_point_ok():
    def fn():
        m = Meter()
        m.charge_comm(rounds=1, bytes_sent=100)
        return m

    p = run_point("sys", 10, fn)
    assert p.status == "ok" and p.seconds is not None and p.seconds > 0


def test_run_point_oom():
    def fn():
        raise SimulatedOOM("x", 10, 1)

    p = run_point("sys", 10, fn)
    assert p.status == "oom" and p.seconds is None


def test_run_point_dnf():
    def fn():
        m = Meter()
        m.charge_extra(10_000)
        return m

    p = run_point("sys", 10, fn, dnf_seconds=3600)
    assert p.status == "dnf" and p.seconds > 3600


def test_format_table_and_markdown():
    pts = [
        Point("a", 100, 1.5, "ok", wall=1.0, sim=0.5),
        Point("b", 200, None, "oom"),
    ]
    txt = format_table("title", pts)
    assert "title" in txt and "a" in txt and "oom" in txt
    md = points_to_markdown(pts)
    assert md.count("|") > 8 and "—" in md
