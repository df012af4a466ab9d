"""Distributed scoring: broadcast a fitted detector, score partitions in
parallel with ``mapInPandas`` (§II: every MoniLog component must be
distributable).

Training stays on the driver (models are small: flow tables, centroids,
a weight vector); *scoring* is the per-line/per-session hot path, so it
is the part that scales out. Tests assert the distributed result is
row-identical to driver-side scoring.
"""
from __future__ import annotations

from typing import Iterator, Mapping

import pandas as pd
from pyspark.sql import DataFrame


def score_sequences(seq_df: DataFrame, detector,
                    templates: Mapping[str, str] | None = None) -> DataFrame:
    """Score a sequences frame (``session_id``, ``events``, ...) with any
    detector exposing ``is_anomalous(seq)`` (n-gram) or
    ``is_anomalous(seq, templates)`` (LogAnomaly) or ``decision(seq)``
    (semantic, on template-text sequences). Returns
    ``(session_id, pred int)``.
    """
    sc = seq_df.sparkSession.sparkContext
    b_model = sc.broadcast(detector)
    b_templates = sc.broadcast(dict(templates) if templates else None)

    def _score(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        model = b_model.value
        tpl = b_templates.value
        for pdf in batches:
            preds = []
            for seq in pdf["events"]:
                seq = list(seq)
                if tpl is not None and hasattr(model, "matcher"):
                    preds.append(int(model.is_anomalous(seq, tpl)))
                elif hasattr(model, "is_anomalous"):
                    preds.append(int(model.is_anomalous(seq)))
                else:
                    preds.append(int(model.decision(seq) > 0))
            yield pd.DataFrame({"session_id": pdf["session_id"], "pred": preds})

    return seq_df.mapInPandas(_score, schema="session_id string, pred int")
