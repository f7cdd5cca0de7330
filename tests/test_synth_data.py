"""Provided TPC-H-lite generators + DuckDB oracle self-tests.

The clustering experiments use ``repro.datasets``; these tests keep the
shipped relational generators and the oracle honest (they are used by
``test_oracle_dpc`` and available to extensions).
"""
from __future__ import annotations

import pandas as pd
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001)


@pytest.fixture(scope="module")
def orders_df(spark):
    return synth_data.orders(spark, sf=0.001)


def test_lineitem_schema(li):
    assert "l_orderkey" in li.columns and "l_quantity" in li.columns


def test_row_counts(spark):
    assert synth_data.customer(spark, sf=0.001).count() == 150
    assert synth_data.part(spark, sf=0.001).count() == 200


def test_deterministic(spark):
    a = synth_data.lineitem(spark, sf=0.0005).toPandas()
    b = synth_data.lineitem(spark, sf=0.0005).toPandas()
    pd.testing.assert_frame_equal(a, b)


def test_oracle_aggregate(spark, li):
    got = li.groupBy("l_returnflag").count().withColumnRenamed("count", "cnt")
    assert_equivalent(
        got,
        "SELECT l_returnflag, CAST(count(*) AS BIGINT) AS cnt "
        "FROM lineitem GROUP BY l_returnflag",
        lineitem=li,
    )


def test_oracle_join(spark, li, orders_df):
    got = (
        li.join(orders_df, li.l_orderkey == orders_df.o_orderkey)
        .groupBy("o_orderpriority")
        .count()
        .withColumnRenamed("count", "cnt")
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, CAST(count(*) AS BIGINT) AS cnt "
        "FROM lineitem JOIN orders ON l_orderkey = o_orderkey "
        "GROUP BY o_orderpriority",
        lineitem=li,
        orders=orders_df,
    )


def test_oracle_catches_wrong_result(spark, li):
    wrong = li.limit(5).groupBy("l_returnflag").count().withColumnRenamed("count", "cnt")
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, CAST(count(*) AS BIGINT) AS cnt "
            "FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > 5 * counts.iloc[-1]


def test_uniform_keys_cover(spark):
    df = synth_data.uniform_keys(spark, n=5000, n_keys=10).toPandas()
    assert df["k"].nunique() == 10
