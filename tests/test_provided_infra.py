"""Exercise the provided TPC-H-lite generators + DuckDB oracle contract."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.mark.parametrize("gen", ["lineitem", "orders", "customer", "part"])
def test_generators_deterministic(spark, gen):
    a = getattr(synth_data, gen)(spark, sf=0.001).toPandas()
    b = getattr(synth_data, gen)(spark, sf=0.001).toPandas()
    assert a.equals(b)
    assert len(a) > 0


def test_oracle_agreement_on_aggregate(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    out = (
        li.groupBy("l_returnflag")
        .count()
        .withColumnRenamed("count", "n")
        .orderBy("l_returnflag")
    )
    assert_equivalent(
        out,
        "SELECT l_returnflag, count(*) AS n FROM lineitem "
        "GROUP BY l_returnflag ORDER BY l_returnflag",
        lineitem=li,
    )


def test_oracle_catches_wrong_result(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    wrong = li.groupBy("l_returnflag").count().withColumnRenamed("count", "n")
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, count(*) + 1 AS n FROM lineitem "
            "GROUP BY l_returnflag",
            lineitem=li,
        )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > counts.iloc[-1] * 3
