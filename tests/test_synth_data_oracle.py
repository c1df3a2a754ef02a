"""Provided scaffolding stays exercised: TPC-H-lite generators (not the
AGL evaluation schema — see DESIGN.md — but part of the repo contract)
and the DuckDB oracle itself."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_deterministic(spark):
    a = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
    b = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
    pd.testing.assert_frame_equal(a, b)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.3).toPandas()
    counts = df.groupby("k").size().sort_values(ascending=False)
    assert counts.iloc[0] > 5 * counts.median()


def test_uniform_keys_range(spark):
    df = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
    assert df.k.between(1, 50).all()


def test_oracle_agreement_on_join(spark):
    li = synth_data.lineitem(spark, sf=0.002)
    o = synth_data.orders(spark, sf=0.002)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        """SELECT o_orderpriority, count(*) AS n
           FROM li JOIN o ON l_orderkey = o_orderkey
           GROUP BY o_orderpriority""",
        li=li,
        o=o,
    )


def test_oracle_detects_wrong_result(spark):
    df = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "n": [10, 20]}))
    with pytest.raises(AssertionError):
        assert_equivalent(
            df,
            "SELECT k, n + 1 AS n FROM t",
            t=pd.DataFrame({"k": [1, 2], "n": [10, 20]}),
        )
