"""Simulated AMT studies (Figures 5-7, Table II).

The paper's Figure 7 establishes empirically that crowd workers process
conflicting facts like the *closest-relevant-value* model. Our offline
substitute instantiates that finding: simulated workers answer with the
closest relevant value perturbed by noise. The analysis pipelines here
then reproduce the paper's comparisons on top of those simulated
answers — verifying the code path, while the behavioural assumption
itself is the one the paper validated (substitution documented in
DESIGN.md §3).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from ..core.facts import FactSet, enumerate_facts
from ..core.model import Fact, Problem
from ..core.speech import render_speech
from ..core import utility as U
from .expectations import MODELS, predict_closest


@dataclass
class RankedSpeech:
    fact_ids: list[int]
    facts: list[Fact]
    utility: float
    normalized: float
    text: str


def rank_random_speeches(
    problem: Problem,
    factset: FactSet,
    n_speeches: int = 100,
    m: int = 3,
    seed: int = 0,
) -> list[RankedSpeech]:
    """Generate ``n_speeches`` random fact combinations and rank them by
    the quality model (the paper's Fig. 5 / Table II setup: best, median
    and worst of 100 random speeches). Sorted best-first."""
    rng = np.random.default_rng(seed)
    out = []
    for _ in range(n_speeches):
        ids = list(rng.choice(factset.n_facts, size=min(m, factset.n_facts), replace=False))
        ids = [int(i) for i in ids]
        util = U.speech_utility(problem, factset, ids)
        facts = [factset.fact(i) for i in ids]
        out.append(
            RankedSpeech(
                fact_ids=ids,
                facts=facts,
                utility=util,
                normalized=U.normalized(problem, util),
                text=render_speech(facts, problem.target_name, None),
            )
        )
    return sorted(out, key=lambda s: -s.utility)


def best_median_worst(ranked: list[RankedSpeech]) -> dict[str, RankedSpeech]:
    return {
        "best": ranked[0],
        "median": ranked[len(ranked) // 2],
        "worst": ranked[-1],
    }


def simulate_ratings(
    speeches: dict[str, RankedSpeech],
    n_workers: int = 50,
    noise: float = 1.5,
    seed: int = 0,
) -> dict[str, dict[str, float]]:
    """Fig. 5 analysis: workers rate each speech 1-10; the latent score
    is affine in normalized utility plus worker noise. Returns per-speech
    average rating and relative-comparison win counts."""
    rng = np.random.default_rng(seed)
    names = list(speeches)
    ratings = {
        name: np.clip(
            1.0 + 9.0 * speeches[name].normalized + rng.normal(0, noise, n_workers),
            1.0,
            10.0,
        )
        for name in names
    }
    wins = {name: 0 for name in names}
    for w in range(n_workers):
        best = max(names, key=lambda nm: ratings[nm][w])
        wins[best] += 1
    return {
        name: {"avg_rating": float(ratings[name].mean()), "wins": wins[name]}
        for name in names
    }


def simulate_worker_estimates(
    facts: list[Fact],
    points: list[dict[str, str]],
    truths: list[float],
    prior: float,
    n_workers: int = 20,
    noise_frac: float = 0.15,
    seed: int = 0,
) -> list[float]:
    """Fig. 6/7 worker behaviour: median of noisy closest-relevant
    answers per data point."""
    rng = np.random.default_rng(seed)
    medians = []
    scale = max(np.std(truths), 1e-9)
    for point, truth in zip(points, truths):
        base = predict_closest(facts, point, truth, prior)
        answers = base + rng.normal(0, noise_frac * scale, n_workers)
        medians.append(float(np.median(answers)))
    return medians


def conflicting_facts_study(
    dim_a: str,
    values_a: tuple[str, str],
    facts_a: tuple[float, float],
    dim_b: str,
    values_b: tuple[str, str],
    facts_b: tuple[float, float],
    truths: dict[tuple[str, str], float],
    prior: float,
    n_workers: int = 20,
    noise_frac: float = 0.1,
    seed: int = 0,
) -> dict[str, float]:
    """Fig. 7 experiment: four facts on two dimensions, workers estimate
    all four value combinations (each combination sees two *conflicting*
    relevant facts). Returns the median |worker - model| error per
    expectation model — 'closest' should win."""
    facts = [
        Fact(scope=((dim_a, values_a[0]),), value=facts_a[0]),
        Fact(scope=((dim_a, values_a[1]),), value=facts_a[1]),
        Fact(scope=((dim_b, values_b[0]),), value=facts_b[0]),
        Fact(scope=((dim_b, values_b[1]),), value=facts_b[1]),
    ]
    points = [
        {dim_a: va, dim_b: vb} for va in values_a for vb in values_b
    ]
    truth_list = [truths[(p[dim_a], p[dim_b])] for p in points]
    workers = simulate_worker_estimates(
        facts, points, truth_list, prior, n_workers, noise_frac, seed
    )
    errors: dict[str, list[float]] = {name: [] for name in MODELS}
    for name, model in MODELS.items():
        for point, truth, worker in zip(points, truth_list, workers):
            pred = model(facts, point, truth, prior)
            errors[name].append(abs(worker - pred))
    return {name: float(np.median(errs)) for name, errs in errors.items()}


def table2_study(
    problem: Problem,
    n_speeches: int = 100,
    m: int = 3,
    seed: int = 0,
) -> dict[str, RankedSpeech]:
    """Table II: best vs worst ranked speech among random candidates."""
    fs = enumerate_facts(problem)
    ranked = rank_random_speeches(problem, fs, n_speeches, m, seed)
    return best_median_worst(ranked)
