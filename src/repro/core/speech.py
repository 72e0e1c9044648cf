"""Speech templating (Section III).

Facts are rendered through a simple text template with placeholders for
the typical value and a variable number of dimension restrictions, and
each speech is prefixed with a description of the summarized data
subset (the query predicates) so users know its semantics — mirroring
the paper's deployed system. Follow-up facts reuse the paper's elliptic
style ("It is 35 for Brooklyn.", cf. Table II).
"""
from __future__ import annotations

from .model import Fact


def render_fact(fact: Fact, target_name: str, first: bool = False) -> str:
    """One sentence for one fact."""
    preds = ", ".join(f"{d} {v}" for d, v in fact.scope)
    value = f"{fact.value:.3g}"
    if first:
        if preds:
            return f"The average {target_name} is {value} for {preds}."
        return f"The average {target_name} is {value} overall."
    if preds:
        return f"It is {value} for {preds}."
    return f"It is {value} overall."


def render_speech(
    facts: list[Fact],
    target_name: str,
    query_predicates: dict[str, str] | None = None,
) -> str:
    """Full speech: subset-description prefix + one sentence per fact."""
    parts: list[str] = []
    if query_predicates:
        desc = ", ".join(f"{d} {v}" for d, v in sorted(query_predicates.items()))
        parts.append(f"About {target_name} for {desc}:")
    elif query_predicates is not None:
        parts.append(f"About {target_name} overall:")
    if not facts:
        parts.append(f"No summary available for {target_name}.")
    for i, f in enumerate(facts):
        parts.append(render_fact(f, target_name, first=(i == 0)))
    return " ".join(parts)
