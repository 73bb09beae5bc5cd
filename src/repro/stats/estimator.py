"""Statistics estimation from sampled epoch data.

CLASH gathers statistics from the tuples observed during an epoch
(Section VI-A, Fig. 2 "statistics computation"). Here an epoch sample is
a pandas DataFrame per relation; we measure

* **arrival rates** — sample size / epoch length,
* **predicate selectivities** — |R ⋈_p S| / (|R|·|S|) via a pandas merge
  on the sampled data (the paper's join-size statistic, normalized).

The resulting :class:`repro.core.cost.Statistics` feeds the ILP.
"""
from __future__ import annotations

from typing import Iterable, Mapping

import pandas as pd

from ..core.cost import Statistics
from ..core.query import Predicate, Query


def predicate_selectivity(
    left: pd.DataFrame, right: pd.DataFrame, p: Predicate
) -> float:
    """|left ⋈_p right| / (|left|·|right|); 0 when either side is empty."""
    nl, nr = len(left), len(right)
    if nl == 0 or nr == 0:
        return 0.0
    lcol, rcol = p.left.name, p.right.name
    lcnt = left[lcol].value_counts()
    rcnt = right[rcol].value_counts()
    joined = lcnt.mul(rcnt, fill_value=0.0).sum()
    return float(joined) / (nl * nr)


def estimate_statistics(
    samples: Mapping[str, pd.DataFrame],
    queries: Iterable[Query],
    *,
    epoch: float,
    parallelism: int = 4,
    windows: Mapping[str, float] | None = None,
) -> Statistics:
    """Build Statistics from one epoch's samples for the given queries."""
    queries = list(queries)
    rates = {rel: len(df) / epoch for rel, df in samples.items()}
    preds: set[Predicate] = set()
    for q in queries:
        preds |= q.predicates
    sels = {}
    for p in sorted(preds):
        lrel, rrel = p.left.rel, p.right.rel
        if lrel in samples and rrel in samples:
            sels[p] = predicate_selectivity(samples[lrel], samples[rrel], p)
    win = dict(windows or {})
    return Statistics(
        rates=rates,
        selectivities=sels,
        windows=win,
        parallelism=parallelism,
    )
