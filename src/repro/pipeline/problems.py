"""Problem Generator (Section III).

Creates one speech-summarization problem per (target column, query)
pair, where a query is a conjunction of up to ``max_query_len`` equality
predicates on the dimension columns, over all value combinations that
appear in the data.

The generator works by *exploding* the data: each row is replicated
once per dimension subset of size ≤ L it can instantiate, tagged with
the canonical query key of its own values on that subset. Grouping the
exploded frame by query key yields exactly the data subset of each
query — this is the shuffle that fans the per-query solver across the
cluster in :mod:`repro.pipeline.preprocess`.
"""
from __future__ import annotations

from functools import reduce
from itertools import combinations

from pyspark.sql import DataFrame
from pyspark.sql import functions as sf

from .config import Config, KEY_SEP, KV_SEP


def _key_expr(subset: tuple[str, ...]):
    """Column expression computing the canonical query key of a row for
    one dimension subset (dims sorted by name, 'd=v|d=v' encoding)."""
    if not subset:
        return sf.lit("")
    parts = [
        sf.concat(sf.lit(d + KV_SEP), sf.col(d).cast("string"))
        for d in sorted(subset)
    ]
    return sf.concat_ws(KEY_SEP, *parts)


def explode_queries(data: DataFrame, config: Config, target: str) -> DataFrame:
    """Replicate each row into every query subset it belongs to.

    Output columns: ``query_key`` + every dimension (as string) + the
    target. Row count = |data| · Σ_{l≤L} C(d, l).
    """
    payload = [sf.col(d).cast("string").alias(d) for d in config.dims] + [
        sf.col(target).cast("double").alias(target)
    ]
    pieces = []
    for size in range(0, config.max_query_len + 1):
        for subset in combinations(config.dims, size):
            pieces.append(
                data.select(_key_expr(subset).alias("query_key"), *payload)
            )
    return reduce(DataFrame.unionByName, pieces)


def count_queries(data: DataFrame, config: Config) -> int:
    """Number of distinct queries per target (the paper's speech counts:
    ~8,500 for flights, ~11,300 for Stack Overflow, ~2,900 for ACS)."""
    exploded = explode_queries(data, config, config.targets[0])
    return exploded.select("query_key").distinct().count()
