"""Spark tests for distributed scoring (detect.scoring)."""
import pytest

from repro.detect.loganomaly import LogAnomalyDetector
from repro.detect.ngram import NGramDetector
from repro.detect.scoring import score_sequences
from repro.detect.sequences import session_sequences
from repro.loggen.generator import StreamSpec, generate
from repro.evaluation.tables import template_map


@pytest.fixture(scope="module")
def data(spark):
    train = generate(StreamSpec(n_sessions=300, n_sources=2, anomaly_rate=0.0, seed=60))
    test = generate(StreamSpec(n_sessions=120, n_sources=2, anomaly_rate=0.1, seed=61))
    strain = session_sequences(spark.createDataFrame(train)).toPandas()
    stest_df = session_sequences(spark.createDataFrame(test)).cache()
    return train, test, strain, stest_df


def test_distributed_equals_driver_ngram(spark, data):
    train, test, strain, stest_df = data
    model = NGramDetector().fit([list(s) for s in strain["events"]])
    dist = score_sequences(stest_df.repartition(8), model).toPandas()
    local = stest_df.toPandas()
    expect = {r.session_id: int(model.is_anomalous(list(r.events)))
              for r in local.itertuples()}
    got = dict(zip(dist["session_id"], dist["pred"]))
    assert got == expect


def test_distributed_equals_driver_loganomaly(spark, data):
    train, test, strain, stest_df = data
    tmap = template_map(train, test)
    model = LogAnomalyDetector().fit([list(s) for s in strain["events"]], tmap)
    dist = score_sequences(stest_df.repartition(8), model, templates=tmap).toPandas()
    local = stest_df.toPandas()
    expect = {r.session_id: int(model.is_anomalous(list(r.events), tmap))
              for r in local.itertuples()}
    got = dict(zip(dist["session_id"], dist["pred"]))
    assert got == expect


def test_all_sessions_scored_once(spark, data):
    _, test, strain, stest_df = data
    model = NGramDetector().fit([list(s) for s in strain["events"]])
    dist = score_sequences(stest_df, model).toPandas()
    assert len(dist) == test["session_id"].nunique()
    assert dist["session_id"].is_unique


def test_detection_quality_through_spark_path(spark, data):
    train, test, strain, stest_df = data
    from repro.evaluation.labels import prf
    model = NGramDetector().fit([list(s) for s in strain["events"]])
    dist = score_sequences(stest_df, model).toPandas()
    truth = test.groupby("session_id")["is_anomaly"].any().astype(int)
    merged = dist.set_index("session_id").join(truth.rename("y"))
    r = prf(merged["y"].tolist(), merged["pred"].tolist())
    assert r.f1 > 0.6
