"""Timestamped micro-batch streams.

``timestamped`` turns a static DataFrame into a stream by assigning
arrival timestamps uniformly over ``[t0, t0 + duration)``; timestamps
are globally unique (a deterministic jitter far below the inter-arrival
scale) so "arrived strictly earlier" is a total order — the engine's
per-start probe orders then partition the join result exactly
(each result is produced exactly once, when its latest tuple arrives).

``StreamSet`` groups the streamed relations and slices them into epochs.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterator, Mapping

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

TAU = "__tau"


def timestamped(
    df: DataFrame,
    *,
    duration: float,
    t0: float = 0.0,
    seed: int = 0,
    stream_id: int = 0,
) -> DataFrame:
    """Assign unique uniform arrival timestamps in ``[t0, t0+duration)``.

    ``stream_id`` de-collides timestamps *across* relations: τ = base +
    (stream_id + 1)·ε jitter with ε far below 1/(rate·#streams).
    """
    n = df.count()
    g = np.random.default_rng(seed + 7919 * stream_id)
    taus = np.sort(g.random(n)) * duration + t0
    # unique jitter: spread ties apart deterministically
    eps = duration / max(1, n) * 1e-6
    taus = taus + np.arange(n) * eps + (stream_id + 1) * eps / 64.0
    spark = df.sparkSession
    tau_df = spark.createDataFrame(
        pd.DataFrame({TAU: taus, "__rid": np.arange(n, dtype=np.int64)})
    )
    with_rid = (
        df.coalesce(1)
        .withColumn("__rid", F.monotonically_increasing_id())
    )
    return with_rid.join(tau_df, "__rid").drop("__rid")


@dataclass
class StreamSet:
    """A set of streamed relations sharing a time axis."""

    relations: dict[str, DataFrame]  # each with a TAU column
    t_end: float

    def slices(self, epoch: float) -> Iterator[tuple[float, dict[str, DataFrame]]]:
        """Yield ``(epoch_start, {rel: batch})`` in time order. Batches
        may be empty DataFrames — the engine handles them uniformly."""
        t = 0.0
        while t < self.t_end - 1e-12:
            hi = min(t + epoch, self.t_end)
            yield t, {
                rel: df.filter((F.col(TAU) >= t) & (F.col(TAU) < hi))
                for rel, df in self.relations.items()
            }
            t = hi

    @staticmethod
    def of(
        dfs: Mapping[str, DataFrame],
        *,
        duration: float,
        seed: int = 0,
    ) -> "StreamSet":
        rels = {}
        for i, (name, df) in enumerate(sorted(dfs.items())):
            rels[name] = timestamped(
                df, duration=duration, seed=seed, stream_id=i
            ).cache()
        return StreamSet(rels, duration)
