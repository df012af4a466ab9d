"""Tests for the provided/extended synthetic-data entry points."""
from repro import synth_data


def test_log_stream_returns_spark_df(spark):
    df = synth_data.log_stream(spark, n_sessions=20, n_sources=2,
                               anomaly_rate=0.1, seed=3)
    pdf = df.toPandas()
    assert {"ts", "source", "message", "session_id", "event_id"} <= set(pdf.columns)
    assert pdf["session_id"].nunique() == 20
    assert set(pdf["source"]) == {"hdfs", "net"}


def test_log_stream_kwargs_passthrough(spark):
    df = synth_data.log_stream(spark, n_sessions=10, seed=3, dup_rate=0.2)
    base = synth_data.log_stream(spark, n_sessions=10, seed=3)
    assert df.count() > base.count()


def test_tpch_lite_generators_scale(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    o = synth_data.orders(spark, sf=0.001)
    assert li.count() == 6000
    assert o.count() == 1500


def test_key_generators(spark):
    z = synth_data.zipf_keys(spark, n=1000, n_keys=50).toPandas()
    u = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
    # zipf is skewed: the modal key much more frequent than uniform's
    assert z["k"].value_counts().iloc[0] > u["k"].value_counts().iloc[0]
