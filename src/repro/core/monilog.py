"""MoniLog core: the three-step system of §II (Fig. 1).

``MoniLog`` wires the components end-to-end over Spark DataFrames:

1. **Parse** — distributed Drain (with §IV structured-data extraction)
   turns the raw message stream into ``(cluster_id, template)``;
2. **Detect** — Spark sessionization structures sequences, the trained
   sequential (n-gram/DeepLog-style) + quantitative models score them
   (distributed via broadcast + ``mapInPandas``) and anomalous sessions
   become :class:`AnomalyReport`;
3. **Classify** — the §V classifier assigns each report a pool and a
   criticality, learning passively from admin actions.

Training (``fit``) consumes an *anomaly-free* stream — the deployment
regime the paper argues for in §III (labelled anomalies are rare and
injecting them is error-prone).

The batch API here is the unit of the streaming pipeline: Structured
Streaming drives exactly these functions per micro-batch / closed
window (see :mod:`repro.streaming.pipeline`).
"""
from __future__ import annotations

import dataclasses

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.classify.classifier import AnomalyClassifier
from repro.classify.pools import AnomalyReport, PoolSystem, make_report
from repro.detect.ngram import NGramDetector
from repro.detect.quantitative import ValueRangeDetector
from repro.detect.scoring import score_sequences
from repro.detect.sequences import session_sequences
from repro.parsing.distributed import parse_distributed
from repro.parsing.drain import extract_variables


@dataclasses.dataclass
class MoniLogConfig:
    depth: int = 4
    st: float = 0.5
    structured: bool = True      # §IV JSON/XML extraction
    h: int = 4                   # n-gram history
    g: int = 9                   # top-g candidates (DeepLog default)
    quant_k: float = 8.0


class MoniLog:
    """End-to-end MoniLog instance over one SparkSession."""

    def __init__(self, spark: SparkSession, config: MoniLogConfig | None = None) -> None:
        self.spark = spark
        self.config = config or MoniLogConfig()
        self.seq_model = NGramDetector(h=self.config.h, g=self.config.g)
        self.quant_model = ValueRangeDetector(k=self.config.quant_k)
        self.classifier = AnomalyClassifier()
        self.pools = PoolSystem()
        self._fitted = False

    # -- step 1: parsing --------------------------------------------------
    def parse(self, raw: DataFrame) -> DataFrame:
        """Raw stream (line_id, ts, source, message, session_id, ...) ->
        structured stream with ``cluster_id``/``template`` columns."""
        cfg = self.config
        parsed, _ = parse_distributed(
            raw, depth=cfg.depth, st=cfg.st, structured=cfg.structured)
        return parsed

    @staticmethod
    def _event_col(parsed: DataFrame) -> DataFrame:
        # the parser's template is the event identity for detection; it is
        # stable across runs (unlike cluster ids, which depend on order)
        return parsed.withColumnRenamed("template", "event_template")

    # -- step 2: detection ------------------------------------------------
    def fit(self, train_raw: DataFrame) -> "MoniLog":
        """Train sequential + quantitative models on a normal stream."""
        parsed = self._event_col(self.parse(train_raw))
        seqs = session_sequences(parsed, event_col="event_template").toPandas()
        self.seq_model.fit([list(s) for s in seqs["events"]])
        rows = parsed.select("event_template", "message").toPandas()
        from repro.parsing.preprocess import preprocess
        self.quant_model.fit(
            (r.event_template,
             extract_variables(r.event_template,
                               preprocess(r.message, structured=self.config.structured)))
            for r in rows.itertuples())
        self._fitted = True
        return self

    def detect(self, raw: DataFrame) -> tuple[pd.DataFrame, list[AnomalyReport]]:
        """Score a stream; returns (per-session predictions, reports)."""
        if not self._fitted:
            raise RuntimeError("call fit() before detect()")
        parsed = self._event_col(self.parse(raw))
        seq_df = session_sequences(parsed, event_col="event_template")
        seq_pred = score_sequences(seq_df, self.seq_model).toPandas()

        from repro.parsing.preprocess import preprocess
        lines = parsed.select("session_id", "source", "level",
                              "event_template", "message").toPandas()
        quant_flags: dict[str, bool] = {}
        for r in lines.itertuples():
            if quant_flags.get(r.session_id):
                continue
            values = extract_variables(
                r.event_template, preprocess(r.message, structured=self.config.structured))
            if self.quant_model.line_flag(r.event_template, values):
                quant_flags[r.session_id] = True
        preds = seq_pred.rename(columns={"pred": "seq_pred"}).copy()
        preds["quant_pred"] = [int(quant_flags.get(s, False)) for s in preds["session_id"]]
        preds["pred"] = ((preds["seq_pred"] == 1) | (preds["quant_pred"] == 1)).astype(int)

        by_session = lines.groupby("session_id")
        reports: list[AnomalyReport] = []
        for r in preds[preds["pred"] == 1].itertuples():
            sess = by_session.get_group(r.session_id)
            detector = "quant" if (r.quant_pred and not r.seq_pred) else "seq"
            reports.append(make_report(
                r.session_id, sess["source"].iloc[0],
                sess["event_template"].tolist(), sess["level"].tolist(), detector))
        return preds, reports

    # -- step 3: classification -------------------------------------------
    def classify(self, reports: list[AnomalyReport]) -> list[tuple[AnomalyReport, str, str]]:
        """Route reports through the pool system by prediction."""
        out = []
        for rep in reports:
            pool, level = self.classifier.ingest(self.pools, route=True, report=rep)
            out.append((rep, pool, level))
        return out

    def run(self, raw: DataFrame) -> list[tuple[AnomalyReport, str, str]]:
        """Full pipeline on a batch: detect then classify."""
        _, reports = self.detect(raw)
        return self.classify(reports)
