"""Synthetic stand-ins for the paper's four evaluation data sets
(Table I): ACS NY disability extract, Stack Overflow 2019 developer
survey, Kaggle flight delays, and FiveThirtyEight democratic primaries.

The originals are public but unavailable offline; each generator
reproduces the *shape* that drives the paper's experiments — the number
of dimension columns, realistic per-dimension cardinalities, the number
of target columns, and dimension-dependent target structure (so that
fact selection is non-trivial: some facts genuinely explain much more
error than others). Row counts scale linearly in ``sf`` with SF=1.0
sized to the paper's byte sizes. All generators are deterministic in
``seed``.

Substitutions are documented in DESIGN.md §3.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass(frozen=True)
class DatasetSpec:
    """Shape metadata for one dataset (the Table I row)."""

    name: str
    dims: tuple[str, ...]
    targets: tuple[str, ...]
    rows_per_sf: int


ACS_SPEC = DatasetSpec(
    name="acs",
    dims=("borough", "age_group", "sex"),
    targets=(
        "hearing_loss",
        "visual_impairment",
        "cognitive_impairment",
        "ambulatory_difficulty",
        "selfcare_difficulty",
        "independent_living_difficulty",
    ),
    rows_per_sf=30_000,
)

STACKOVERFLOW_SPEC = DatasetSpec(
    name="stackoverflow",
    dims=(
        "country",
        "dev_type",
        "education",
        "employment",
        "company_size",
        "years_coding",
        "age_group",
    ),
    targets=(
        "competence",
        "optimism",
        "job_satisfaction",
        "career_satisfaction",
        "salary_band",
        "work_hours",
    ),
    rows_per_sf=900_000,
)

FLIGHTS_SPEC = DatasetSpec(
    name="flights",
    dims=("airline", "origin_state", "season", "month", "day_of_week", "daytime"),
    targets=("delay_minutes", "cancelled"),
    rows_per_sf=5_800_000,
)

PRIMARIES_SPEC = DatasetSpec(
    name="primaries",
    dims=("candidate", "state", "region", "education_level", "urbanity"),
    targets=("support_pct",),
    rows_per_sf=60_000,
)

SPECS = {
    s.name: s for s in (ACS_SPEC, STACKOVERFLOW_SPEC, FLIGHTS_SPEC, PRIMARIES_SPEC)
}

_BOROUGHS = ["Manhattan", "Brooklyn", "Queens", "Bronx", "Staten Island"]
_AGE_GROUPS = ["children", "teenagers", "young adults", "adults", "middle aged", "seniors", "elder"]
_AIRLINES = [f"Airline{c}" for c in "ABCDEFGHIJKLMN"]
_STATES = [f"S{i:02d}" for i in range(52)]
_SEASONS = ["Winter", "Spring", "Summer", "Fall"]
_MONTHS = ["Jan", "Feb", "Mar", "Apr", "May", "Jun", "Jul", "Aug", "Sep", "Oct", "Nov", "Dec"]
_SEASON_OF_MONTH = {
    "Dec": "Winter", "Jan": "Winter", "Feb": "Winter",
    "Mar": "Spring", "Apr": "Spring", "May": "Spring",
    "Jun": "Summer", "Jul": "Summer", "Aug": "Summer",
    "Sep": "Fall", "Oct": "Fall", "Nov": "Fall",
}
_WEEKDAYS = ["Mon", "Tue", "Wed", "Thu", "Fri", "Sat", "Sun"]
_DAYTIMES = ["morning", "afternoon", "evening", "night"]


def _n(spec: DatasetSpec, sf: float) -> int:
    return max(8, int(spec.rows_per_sf * sf))


def _effect(rng: np.random.Generator, values: list[str], scale: float) -> dict[str, float]:
    """A per-value additive effect, deterministic in the rng state."""
    return dict(zip(values, rng.normal(0.0, scale, len(values))))


def _lookup(effects: dict[str, float], col: pd.Series) -> np.ndarray:
    return col.map(effects).to_numpy(dtype=np.float64)


def acs_pandas(*, sf: float = 0.01, seed: int = 0) -> pd.DataFrame:
    """ACS NY-style disability prevalence per 1000 persons."""
    rng = np.random.default_rng(seed)
    n = _n(ACS_SPEC, sf)
    df = pd.DataFrame(
        {
            "borough": rng.choice(_BOROUGHS, n),
            "age_group": rng.choice(_AGE_GROUPS, n),
            "sex": rng.choice(["male", "female"], n),
        }
    )
    # prevalence rises steeply with age (the structure behind Table II's
    # best speech referencing age groups)
    age_base = {g: 3.0 + 12.0 * i**1.6 for i, g in enumerate(_AGE_GROUPS)}
    for t in ACS_SPEC.targets:
        eff_b = _effect(rng, _BOROUGHS, 4.0)
        eff_s = _effect(rng, ["male", "female"], 2.0)
        scale = rng.uniform(0.3, 1.0)
        vals = (
            scale * _lookup(age_base, df["age_group"])
            + _lookup(eff_b, df["borough"])
            + _lookup(eff_s, df["sex"])
            + rng.normal(0, 3.0, n)
        )
        df[t] = np.clip(vals, 0.0, None).round(1)
    return df


def stackoverflow_pandas(*, sf: float = 0.01, seed: int = 1) -> pd.DataFrame:
    """Stack Overflow survey-style data: 7 dims, 6 score targets."""
    rng = np.random.default_rng(seed)
    n = _n(STACKOVERFLOW_SPEC, sf)
    dims_values = {
        "country": [f"Country{i:02d}" for i in range(20)],
        "dev_type": ["backend", "frontend", "fullstack", "mobile", "data", "devops", "embedded", "qa"],
        "education": ["self-taught", "bootcamp", "bachelor", "master", "doctorate"],
        "employment": ["full-time", "part-time", "freelance", "student"],
        "company_size": ["1-9", "10-99", "100-499", "500-999", "1000-4999", "5000+"],
        "years_coding": ["0-2", "3-5", "6-10", "11-20", "21-30", "30+"],
        "age_group": ["under 25", "25-34", "35-44", "45-54", "55+"],
    }
    df = pd.DataFrame({d: rng.choice(v, n) for d, v in dims_values.items()})
    for t in STACKOVERFLOW_SPEC.targets:
        base = rng.uniform(4.0, 7.0)
        vals = np.full(n, base)
        for d, values in dims_values.items():
            vals += _lookup(_effect(rng, values, rng.uniform(0.1, 0.8)), df[d])
        df[t] = np.clip(vals + rng.normal(0, 0.8, n), 0.0, 10.0).round(2)
    return df


def flights_pandas(*, sf: float = 0.01, seed: int = 2) -> pd.DataFrame:
    """Flight-delay-style data: 6 dims; delay minutes and cancellation.

    ``season`` is derived from ``month`` (correlated dimensions, as in
    the real data), winter/month/airline effects drive the targets."""
    rng = np.random.default_rng(seed)
    n = _n(FLIGHTS_SPEC, sf)
    month = rng.choice(_MONTHS, n)
    df = pd.DataFrame(
        {
            "airline": rng.choice(_AIRLINES, n),
            "origin_state": rng.choice(_STATES, n),
            "season": pd.Series(month).map(_SEASON_OF_MONTH).to_numpy(),
            "month": month,
            "day_of_week": rng.choice(_WEEKDAYS, n),
            "daytime": rng.choice(_DAYTIMES, n),
        }
    )
    eff_airline = _effect(rng, _AIRLINES, 6.0)
    eff_state = _effect(rng, _STATES, 3.0)
    season_delay = {"Winter": 14.0, "Spring": 2.0, "Summer": 7.0, "Fall": 0.0}
    feb_extra = np.where(df["month"] == "Feb", 8.0, 0.0)
    delay = (
        10.0
        + _lookup(season_delay, df["season"])
        + _lookup(eff_airline, df["airline"])
        + _lookup(eff_state, df["origin_state"])
        + feb_extra
        + rng.exponential(8.0, n)
        - 8.0
    )
    df["delay_minutes"] = np.clip(delay, -10.0, None).round(1)
    p_cancel = np.clip(
        0.03
        + 0.04 * (df["season"] == "Winter").to_numpy()
        + 0.05 * (df["month"] == "Feb").to_numpy()
        + _lookup(_effect(rng, _AIRLINES, 0.01), df["airline"]),
        0.001,
        0.6,
    )
    df["cancelled"] = (rng.random(n) < p_cancel).astype(np.float64)
    return df


def primaries_pandas(*, sf: float = 0.01, seed: int = 3) -> pd.DataFrame:
    """Democratic-primaries-style polling data: 5 dims, 1 target."""
    rng = np.random.default_rng(seed)
    n = _n(PRIMARIES_SPEC, sf)
    candidates = [f"Candidate{c}" for c in "ABCDEFGH"]
    states = [f"St{i:02d}" for i in range(20)]
    regions = ["Northeast", "South", "Midwest", "West"]
    df = pd.DataFrame(
        {
            "candidate": rng.choice(candidates, n),
            "state": rng.choice(states, n),
            "region": rng.choice(regions, n),
            "education_level": rng.choice(["no college", "some college", "college", "postgrad"], n),
            "urbanity": rng.choice(["urban", "suburban", "rural"], n),
        }
    )
    cand_base = _effect(rng, candidates, 8.0)
    vals = (
        20.0
        + _lookup(cand_base, df["candidate"])
        + _lookup(_effect(rng, regions, 4.0), df["region"])
        + rng.normal(0, 5.0, n)
    )
    df["support_pct"] = np.clip(vals, 0.0, 100.0).round(1)
    return df


_PANDAS_GENERATORS = {
    "acs": acs_pandas,
    "stackoverflow": stackoverflow_pandas,
    "flights": flights_pandas,
    "primaries": primaries_pandas,
}


def load_pandas(name: str, *, sf: float = 0.01, seed: int | None = None) -> pd.DataFrame:
    """Generate a dataset by name as pandas."""
    gen = _PANDAS_GENERATORS[name]
    return gen(sf=sf) if seed is None else gen(sf=sf, seed=seed)


def load_spark(
    spark: SparkSession, name: str, *, sf: float = 0.01, seed: int | None = None
) -> DataFrame:
    """Generate a dataset by name as a Spark DataFrame."""
    return spark.createDataFrame(load_pandas(name, sf=sf, seed=seed))
