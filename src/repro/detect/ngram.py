"""DeepLog-style sequential anomaly detection (Du et al., CCS'17).

DeepLog trains an LSTM on *normal* execution only and flags a window
whose actual next event is not among the model's top-``g`` predicted
candidates. The substitution here (DESIGN.md S8: no DL framework in the
container) keeps that exact detection rule and training regime but
replaces the LSTM with a backoff **n-gram next-event model**: the
conditional next-event distribution given the last ``h`` events, falling
back to shorter histories when unseen. On workflow-generated logs the
conditional distribution *is* the flow graph, so the model class is
sufficient for every trend the paper's experiments probe.

Vocabulary is closed-world (the §III critique this paper levels at
DeepLog): an event id never seen in training has no history entry and is
flagged through the backoff miss — which is precisely why instability
(T4) and parsing errors (T2) hurt this detector.
"""
from __future__ import annotations

from collections import Counter, defaultdict
from typing import Iterable, Sequence

BOS = "<s>"
EOS = "</s>"


class NGramDetector:
    """Backoff n-gram next-event predictor with DeepLog's top-g rule.

    ``use_eos`` appends an end-of-session marker so that a *silently
    truncated* flow (session ends mid-flow with no error logged) is
    caught: the model expects the flow's continuation, sees EOS instead.
    """

    def __init__(self, *, h: int = 4, g: int = 9, use_eos: bool = True) -> None:
        if h < 1:
            raise ValueError("history length h must be >= 1")
        if g < 1:
            raise ValueError("candidate count g must be >= 1")
        self.h = h
        self.g = g
        self.use_eos = use_eos
        # order k history tuple -> Counter of next events, for k in 1..h
        self._tables: list[dict[tuple, Counter]] = [defaultdict(Counter) for _ in range(h)]
        self.vocab: set[str] = set()

    # -- training ---------------------------------------------------------
    def fit(self, sequences: Iterable[Sequence[str]]) -> "NGramDetector":
        """Train on normal sequences only (the anomaly-free regime of the
        paper's §III experiment 1)."""
        for seq in sequences:
            padded = [BOS] * self.h + list(seq) + ([EOS] if self.use_eos else [])
            self.vocab.update(seq)
            if self.use_eos:
                self.vocab.add(EOS)
            for i in range(self.h, len(padded)):
                nxt = padded[i]
                for k in range(1, self.h + 1):
                    hist = tuple(padded[i - k:i])
                    self._tables[k - 1][hist][nxt] += 1
        return self

    # -- scoring ----------------------------------------------------------
    def _top_g(self, hist: tuple) -> list[str] | None:
        """Top-g candidates for the longest known history suffix; None if
        even the unigram context is unknown."""
        for k in range(len(hist), 0, -1):
            table = self._tables[k - 1]
            counter = table.get(hist[-k:])
            if counter:
                return [e for e, _ in counter.most_common(self.g)]
        return None

    def window_flags(self, seq: Sequence[str]) -> list[bool]:
        """Per-position anomaly flags (True = next event not in top-g)."""
        padded = [BOS] * self.h + list(seq) + ([EOS] if self.use_eos else [])
        flags = []
        for i in range(self.h, len(padded)):
            nxt = padded[i]
            if nxt not in self.vocab:
                flags.append(True)  # unseen event id: outside the model's world
                continue
            cands = self._top_g(tuple(padded[i - self.h:i]))
            flags.append(cands is None or nxt not in cands)
        return flags

    def is_anomalous(self, seq: Sequence[str]) -> bool:
        """DeepLog's session rule: anomalous iff any window is flagged."""
        return any(self.window_flags(seq))

    def score(self, seq: Sequence[str]) -> float:
        """Fraction of flagged windows — a graded score for thresholding
        experiments; 0.0 for an empty sequence."""
        flags = self.window_flags(seq)
        return sum(flags) / len(flags) if flags else 0.0

    def predict(self, sequences: Iterable[Sequence[str]]) -> list[int]:
        return [int(self.is_anomalous(s)) for s in sequences]
