"""Synthetic deployment query log + request classifier (Table III,
Figure 9a).

The paper analyzes the last 50 voice requests of each of its three
Google Assistant deployments, classifying them as Help, Repeat,
supported data-access query (S-Query), unsupported query (U-Query), or
Other. The live logs are unavailable; this module (a) generates a
synthetic request log whose category mix follows the paper's observed
per-deployment proportions, phrased through per-category templates, and
(b) implements the request classifier that produces the Table III
counts and the Figure 9(a) predicate-count histogram from raw request
strings. The classifier is exercised end-to-end on the generated logs.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

# Per-deployment category mix observed in the paper's Table III
# (counts out of the last 50 requests).
PAPER_TABLE3 = {
    "primaries": {"Help": 17, "Repeat": 3, "S-Query": 16, "U-Query": 1, "Other": 13},
    "flights": {"Help": 9, "Repeat": 0, "S-Query": 12, "U-Query": 5, "Other": 24},
    "developers": {"Help": 4, "Repeat": 0, "S-Query": 13, "U-Query": 16, "Other": 17},
}

_HELP = ["help", "what can I ask", "how does this work", "help me please"]
_REPEAT = ["repeat that", "say that again", "repeat the last answer"]
_OTHER = ["thanks", "stop", "good morning", "play some music", "never mind", "ok"]
_UNSUPPORTED_TEMPLATES = [
    "make a comparison between {t} for {v1} and {v2}",
    "which {d} has the maximum {t}",
    "what is the {t} of flight 123",
    "compare {v1} versus {v2}",
]


@dataclass(frozen=True)
class Vocabulary:
    """Dataset vocabulary the extractor was trained on: target-column
    names and per-dimension values (Section III's text-to-query step)."""

    targets: tuple[str, ...]
    dim_values: dict[str, tuple[str, ...]]

    def all_values(self) -> set[str]:
        return {v.lower() for vs in self.dim_values.values() for v in vs}


def generate_log(
    vocab: Vocabulary,
    deployment: str,
    n: int = 50,
    seed: int = 0,
) -> list[str]:
    """Generate ``n`` raw voice requests with the deployment's category
    mix (drawn i.i.d. from the Table III proportions)."""
    rng = np.random.default_rng(seed)
    mix = PAPER_TABLE3[deployment]
    cats = list(mix)
    probs = np.array([mix[c] for c in cats], dtype=float)
    probs /= probs.sum()
    dims = list(vocab.dim_values)
    out = []
    for c in rng.choice(cats, size=n, p=probs):
        if c == "Help":
            out.append(str(rng.choice(_HELP)))
        elif c == "Repeat":
            out.append(str(rng.choice(_REPEAT)))
        elif c == "Other":
            out.append(str(rng.choice(_OTHER)))
        elif c == "S-Query":
            t = str(rng.choice(vocab.targets))
            # 0-2 predicates, weighted toward 1 (Figure 9a's shape)
            n_preds = int(rng.choice([0, 1, 2], p=[0.3, 0.5, 0.2]))
            chosen = rng.choice(dims, size=n_preds, replace=False)
            vals = [str(rng.choice(vocab.dim_values[d])) for d in chosen]
            if n_preds == 0:
                out.append(f"what is the {t}")
            else:
                out.append(f"{t} for " + " and ".join(vals))
        else:  # U-Query
            tpl = str(rng.choice(_UNSUPPORTED_TEMPLATES))
            d = str(rng.choice(dims))
            v1, v2 = (
                str(rng.choice(vocab.dim_values[d])),
                str(rng.choice(vocab.dim_values[d])),
            )
            out.append(
                tpl.format(t=str(rng.choice(vocab.targets)), d=d, v1=v1, v2=v2)
            )
    return out


_UNSUPPORTED_MARKERS = (
    "compare",
    "comparison",
    "maximum",
    "minimum",
    "versus",
    "which",
    "flight ",
)


def classify_request(request: str, vocab: Vocabulary) -> str:
    """Classify one raw request (the Table III categories)."""
    q = request.lower().strip()
    if "help" in q or "how does this work" in q or "what can i ask" in q:
        return "Help"
    if "repeat" in q or "again" in q:
        return "Repeat"
    mentions_target = any(t.lower() in q for t in vocab.targets)
    if any(marker in q for marker in _UNSUPPORTED_MARKERS):
        # asks for extrema/comparison/unavailable data
        return "U-Query" if mentions_target or _count_predicates(q, vocab) else "Other"
    if mentions_target:
        return "S-Query"
    return "Other"


def _count_predicates(q: str, vocab: Vocabulary) -> int:
    return sum(1 for v in vocab.all_values() if v in q)


def predicate_count(request: str, vocab: Vocabulary) -> int:
    """Number of dimension-value mentions (Figure 9a histogram)."""
    return _count_predicates(request.lower(), vocab)


def classify_log(log: list[str], vocab: Vocabulary) -> dict[str, int]:
    """Table III row: category counts over a request log."""
    counts = {c: 0 for c in ("Help", "Repeat", "S-Query", "U-Query", "Other")}
    for r in log:
        counts[classify_request(r, vocab)] += 1
    return counts
