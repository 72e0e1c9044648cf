"""The four user-expectation models compared in Figure 7.

Given the facts heard and one data point (a full dimension-value
assignment), each model predicts the value a user would estimate:

- ``closest``  — the relevant (within-scope) proposed value closest to
  the true value (the paper's chosen model, Definition 4);
- ``farthest`` — the relevant value farthest from the truth;
- ``mean_relevant`` — the average of relevant proposed values;
- ``mean_all`` — the average of *all* proposed values, relevant or not.

The prior participates as a proposed value for every row (Definition 4)
in the ``closest``/``farthest`` models; the averaging models use only
fact values, as in the paper's Figure 7 comparison.
"""
from __future__ import annotations

import numpy as np

from ..core.model import Fact


def relevant_values(facts: list[Fact], point: dict[str, str]) -> list[float]:
    """Typical values of facts whose scope covers the data point."""
    out = []
    for f in facts:
        if all(point.get(d) == v for d, v in f.scope):
            out.append(f.value)
    return out


def predict_closest(
    facts: list[Fact], point: dict[str, str], truth: float, prior: float
) -> float:
    vals = relevant_values(facts, point) + [prior]
    return min(vals, key=lambda v: abs(v - truth))


def predict_farthest(
    facts: list[Fact], point: dict[str, str], truth: float, prior: float
) -> float:
    vals = relevant_values(facts, point) + [prior]
    return max(vals, key=lambda v: abs(v - truth))


def predict_mean_relevant(
    facts: list[Fact], point: dict[str, str], truth: float, prior: float
) -> float:
    vals = relevant_values(facts, point)
    return float(np.mean(vals)) if vals else prior


def predict_mean_all(
    facts: list[Fact], point: dict[str, str], truth: float, prior: float
) -> float:
    vals = [f.value for f in facts]
    return float(np.mean(vals)) if vals else prior


MODELS = {
    "closest": predict_closest,
    "farthest": predict_farthest,
    "mean_relevant": predict_mean_relevant,
    "mean_all": predict_mean_all,
}
