"""Spark tests for the distributed Drain (parsing.distributed)."""
import pytest

from repro.loggen.generator import StreamSpec, generate
from repro.parsing import metrics
from repro.parsing.distributed import parse_distributed, parse_single_node


@pytest.fixture(scope="module")
def stream():
    return generate(StreamSpec(n_sessions=150, n_sources=4, anomaly_rate=0.05,
                               seed=55))


@pytest.fixture(scope="module")
def parsed(spark, stream):
    sdf = spark.createDataFrame(stream[["line_id", "message"]]).repartition(8)
    out, mapping = parse_distributed(sdf)
    return out.toPandas().sort_values("line_id").reset_index(drop=True), mapping


def test_every_line_parsed(parsed, stream):
    got, _ = parsed
    assert len(got) == len(stream)
    assert got["cluster_id"].notna().all()
    assert got["template"].notna().all()


def test_grouping_matches_single_node_quality(spark, parsed, stream):
    got, _ = parsed
    ga_dist = metrics.grouping_accuracy(stream["event_id"].tolist(),
                                        got["cluster_id"].tolist())
    single, _ = parse_single_node(spark.createDataFrame(stream[["line_id", "message"]]))
    single = single.sort_values("line_id").reset_index(drop=True)
    ga_single = metrics.grouping_accuracy(stream["event_id"].tolist(),
                                          single["cluster_id"].tolist())
    # the merge must not cost more than a few points of grouping accuracy
    assert ga_dist >= ga_single - 0.05
    assert ga_dist >= 0.9


def test_mapping_covers_all_local_templates(parsed):
    got, mapping = parsed
    global_ids = {gid for gid, _ in mapping.values()}
    assert set(got["cluster_id"]) <= global_ids


def test_mapping_templates_nonempty(parsed):
    _, mapping = parsed
    for tpl, (gid, gtpl) in mapping.items():
        assert isinstance(gid, int) and gtpl != ""


def test_global_template_count_near_gt(parsed, stream):
    got, mapping = parsed
    n_gt = stream["event_id"].nunique()
    n_global = len({gid for gid, _ in mapping.values()})
    assert n_gt <= n_global <= n_gt * 1.5


def test_deterministic_across_runs(spark, stream):
    sdf = spark.createDataFrame(stream[["line_id", "message"]]).repartition(8)
    a, _ = parse_distributed(sdf)
    b, _ = parse_distributed(sdf)
    pa = a.toPandas().sort_values("line_id")["template"].tolist()
    pb = b.toPandas().sort_values("line_id")["template"].tolist()
    assert pa == pb


def test_single_partition_equals_single_node(spark, stream):
    # with one partition the distributed path degenerates to plain Drain
    sdf = spark.createDataFrame(stream[["line_id", "message"]]).coalesce(1)
    dist, _ = parse_distributed(sdf)
    dist = dist.toPandas().sort_values("line_id").reset_index(drop=True)
    single, _ = parse_single_node(spark.createDataFrame(stream[["line_id", "message"]]))
    single = single.sort_values("line_id").reset_index(drop=True)
    ga = metrics.grouping_accuracy(single["cluster_id"].tolist(),
                                   dist["cluster_id"].tolist())
    assert ga == 1.0


def test_gt_template_column_replaced(spark, stream):
    # a pre-existing ground-truth `template` column must not leak through
    sdf = spark.createDataFrame(stream)  # includes GT template column
    out, _ = parse_distributed(sdf)
    assert len([c for c in out.columns if c == "template"]) == 1


def test_mask_option_runs(spark, stream):
    sdf = spark.createDataFrame(stream[["line_id", "message"]]).repartition(4)
    out, mapping = parse_distributed(sdf, mask=True)
    assert out.count() == len(stream)
