"""Parsing-quality metrics: grouping accuracy and the paper's Eq. 1.

Two metrics drive T5/T6:

* **Grouping accuracy** (the literature's reference metric, Zhu et al.
  ICSE-SEIP'19): a line is correct iff the parser put it in a cluster
  containing exactly the lines of its ground-truth template — relevant
  for *sequential* anomaly detection (L1 and L3 of Table I must land in
  the same class).
* **Eq. 1 token accuracy** (the paper's §IV proposed metric): mean over
  lines of the fraction of tokens whose parsed value matches the
  expected value — relevant for *quantitative* anomalies, which are
  only detectable if variable parts are identified. Per §IV, token j of
  a parsed line takes the template's static token at static positions
  and the extracted variable value at ``<*>`` positions.

  The literal form under-penalises static->variable confusion (the
  extracted value then *equals* the original static token), so
  ``token_accuracy(..., strict=True)`` additionally requires the
  static/variable *role* to agree with ground truth; T5 reports both.
"""
from __future__ import annotations

from collections import Counter, defaultdict
from typing import Sequence

from repro.parsing.drain import WILDCARD, tokenize


def grouping_accuracy(gt_ids: Sequence[str], pred_ids: Sequence[int | str]) -> float:
    """Fraction of lines whose predicted cluster coincides exactly (as a
    line set) with their ground-truth template's line set."""
    if len(gt_ids) != len(pred_ids):
        raise ValueError("gt_ids and pred_ids must align")
    n = len(gt_ids)
    if n == 0:
        return 1.0
    gt_sizes = Counter(gt_ids)
    pred_sizes = Counter(pred_ids)
    pair = Counter(zip(gt_ids, pred_ids))
    correct = 0
    for (g, p), c in pair.items():
        # the predicted cluster is exactly the GT group iff they have the
        # same size and every line of the predicted cluster is this pair
        if c == gt_sizes[g] == pred_sizes[p]:
            correct += c
    return correct / n


def _parsed_tokens(template: str, message: str) -> list[tuple[str, bool]]:
    """Per-token (value, is_variable) of a parse result, per §IV: static
    positions yield the template token, ``<*>`` positions the message
    token. Length mismatch (a badly merged template) marks every token
    as a wildcard variable so nothing static can count as correct."""
    t_toks = tokenize(template)
    m_toks = tokenize(message)
    if len(t_toks) != len(m_toks):
        return [(m, True) for m in m_toks]
    return [(m if t == WILDCARD else t, t == WILDCARD) for t, m in zip(t_toks, m_toks)]


def gt_token_stream(gt_template: str, values: Sequence[str], message: str) -> list[tuple[str, bool]]:
    """Ground-truth (value, is_variable) per *message* token.

    Templates render values *inside* surrounding punctuation (e.g.
    ``src: /<*>`` renders as ``/10.0.0.1``), so GT tokens are aligned to
    the actual message tokens: a message token is variable iff it differs
    from the corresponding static-template token."""
    t_toks = tokenize(gt_template)
    m_toks = tokenize(message)
    if len(t_toks) == len(m_toks):
        return [(m, t == WILDCARD or t != m) for t, m in zip(t_toks, m_toks)]
    # structured tail appended (JSON keys) or token-mangled line: fall back
    # to marking surplus tokens variable
    out = [(m, t == WILDCARD or t != m) for t, m in zip(t_toks, m_toks)]
    out.extend((m, True) for m in m_toks[len(t_toks):])
    return out


def token_accuracy(rows: Sequence[tuple[str, str, str, Sequence[str]]],
                   *, strict: bool = False) -> float:
    """Eq. 1 over ``rows`` of (parsed_template, message, gt_template,
    gt_values): mean over lines of per-line token-match fraction.

    ``strict`` additionally requires role (static/variable) agreement.
    """
    if not rows:
        return 1.0
    acc = 0.0
    for parsed_template, message, gt_template, gt_values in rows:
        parsed = _parsed_tokens(parsed_template, message)
        gt = gt_token_stream(gt_template, list(gt_values), message)
        L = max(len(parsed), len(gt))
        if L == 0:
            acc += 1.0
            continue
        ok = 0
        for j in range(min(len(parsed), len(gt))):
            (pv, pvar), (gv, gvar) = parsed[j], gt[j]
            if pv == gv and (not strict or pvar == gvar):
                ok += 1
        acc += ok / L
    return acc / len(rows)


def templates_per_gt(gt_ids: Sequence[str], pred_ids: Sequence[int | str]) -> float:
    """Mean number of predicted clusters per ground-truth template — >1
    means over-splitting, the §IV automation failure mode."""
    groups: dict[str, set] = defaultdict(set)
    for g, p in zip(gt_ids, pred_ids):
        groups[g].add(p)
    if not groups:
        return 0.0
    return sum(len(v) for v in groups.values()) / len(groups)
