"""Problem model (Section II of the paper).

A :class:`Problem` is one *speech summarization problem instance*
``<R, F, m>``: a relation ``R`` with dimension columns and one numeric
target column, to be summarized by up to ``m`` facts. Dimension values
are integer-coded so the solver kernels are pure NumPy; labels are kept
for speech rendering.

The *prior* is the constant user expectation before listening
(Definition 4). The paper's experiments use the average value of the
target column as the prior (Section VIII-A); :meth:`Problem.from_pandas`
defaults to that.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd


@dataclass(frozen=True)
class Fact:
    """A fact ``<D, v>`` (Definition 2): a scope mapping dimension names
    to values plus the average target value within that scope."""

    scope: tuple[tuple[str, str], ...]  # sorted (dim, value) pairs
    value: float

    @property
    def scope_dict(self) -> dict[str, str]:
        return dict(self.scope)

    def __str__(self) -> str:  # compact debugging form
        preds = ", ".join(f"{d}={v}" for d, v in self.scope) or "overall"
        return f"[{preds}: {self.value:.4g}]"


@dataclass
class Problem:
    """One summarization problem over an integer-coded relation.

    ``dim_matrix[i, j]`` is the code of row ``i`` in dimension ``j``;
    ``dim_labels[j][c]`` maps code ``c`` back to the original value.
    """

    dim_names: list[str]
    dim_matrix: np.ndarray  # (n, d) int32
    dim_labels: list[np.ndarray]  # per-dim array of original values
    target: np.ndarray  # (n,) float64
    prior: float
    target_name: str = "target"

    def __post_init__(self) -> None:
        self.dim_matrix = np.ascontiguousarray(self.dim_matrix, dtype=np.int32)
        self.target = np.ascontiguousarray(self.target, dtype=np.float64)
        if self.dim_matrix.shape[0] != self.target.shape[0]:
            raise ValueError("dim_matrix and target row counts differ")
        if self.dim_matrix.shape[1] != len(self.dim_names):
            raise ValueError("dim_matrix width != number of dimension names")

    @property
    def n_rows(self) -> int:
        return self.target.shape[0]

    @property
    def n_dims(self) -> int:
        return len(self.dim_names)

    def prior_deviation(self) -> np.ndarray:
        """Per-row deviation ``|P(r) - v_r|`` under the empty speech."""
        return np.abs(self.target - self.prior)

    @classmethod
    def from_pandas(
        cls,
        df: pd.DataFrame,
        dims: list[str],
        target: str,
        prior: float | None = None,
    ) -> "Problem":
        """Build a problem from a pandas frame; prior defaults to the
        average target value over ``df`` (the paper's constant prior)."""
        if len(df) == 0:
            raise ValueError("cannot summarize an empty relation")
        mat = np.empty((len(df), len(dims)), dtype=np.int32)
        labels: list[np.ndarray] = []
        for j, d in enumerate(dims):
            codes, uniques = pd.factorize(df[d].astype(str), sort=True)
            mat[:, j] = codes
            labels.append(np.asarray(uniques))
        tgt = df[target].to_numpy(dtype=np.float64)
        return cls(
            dim_names=list(dims),
            dim_matrix=mat,
            dim_labels=labels,
            target=tgt,
            prior=float(np.mean(tgt)) if prior is None else float(prior),
            target_name=target,
        )


@dataclass
class SpeechResult:
    """Result of one solver run: the selected facts plus bookkeeping.

    ``utility`` is absolute utility ``U(F*)`` (Definition 6);
    ``normalized`` divides by ``D(∅)`` so 1.0 means a perfect
    approximation (the paper scales utility to one per instance).
    ``rows_processed`` counts rows scanned by utility/bound
    aggregations — a machine-independent cost proxy for the paper's
    Postgres query costs.
    """

    facts: list[Fact]
    utility: float
    normalized: float
    rows_processed: int = 0
    facts_evaluated: int = 0
    extra: dict = field(default_factory=dict)
