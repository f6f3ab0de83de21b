"""Cost model: tuples accessed / skipped for a layout under a workload.

Implements Eq. (1): a block is *accessed* by query ``q`` iff its metadata
intersects ``q``; the workload's logical cost is the sum of accessed block
sizes over all queries. ``C(P)`` (tuples skipped) is the complement.

Two evaluation modes:

* :func:`evaluate_layout` — the uniform Table-2 scorer: given the row→BID
  assignment of *any* partitioner, recompute per-block stats (min-max +
  categorical masks + AC bits) from the actual rows and score the workload.
  Used identically for the random/range baselines, Bottom-Up, Greedy and
  WOODBLOCK so comparisons are apples-to-apples.
* :func:`access_fraction_descs` — score pre-computed descriptions (used
  during construction, where descriptions come from cut restriction).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

import numpy as np
import pandas as pd

from .predicates import Node
from .qdtree import block_description
from .schema import TableSchema


@dataclass
class LayoutMetrics:
    """Logical skipping metrics of one layout under one workload."""

    n_rows: int
    n_queries: int
    n_blocks: int
    tuples_accessed: int  # Σ_q Σ_blocks |B|·[B intersects q]
    tuples_selected: int  # Σ_q |σ_q(V)| — true selectivity lower bound

    @property
    def access_fraction(self) -> float:
        return self.tuples_accessed / (self.n_rows * self.n_queries)

    @property
    def skipped(self) -> int:
        return self.n_rows * self.n_queries - self.tuples_accessed

    @property
    def selectivity(self) -> float:
        return self.tuples_selected / (self.n_rows * self.n_queries)


def access_fraction_descs(
    descs_sizes: Sequence[tuple], workload: Sequence[Node], n_rows: int
) -> float:
    """Accessed fraction from (description, size) pairs."""
    accessed = 0
    for desc, size in descs_sizes:
        for q in workload:
            if desc.may_intersect(q):
                accessed += size
    return accessed / (n_rows * len(workload))


def evaluate_layout(
    encoded: pd.DataFrame,
    bids: np.ndarray,
    schema: TableSchema,
    workload: Sequence[Node],
    acs: dict | None = None,
) -> LayoutMetrics:
    """Uniform block-stats scoring of a row→BID assignment (Table 2)."""
    from .predicates import eval_mask

    acs = acs or {}
    n = len(encoded)
    uniq = np.unique(bids)
    accessed = 0
    for b in uniq:
        rows = encoded.iloc[np.flatnonzero(bids == b)]
        desc = block_description(rows, schema, acs)
        for q in workload:
            if desc.may_intersect(q):
                accessed += len(rows)
    selected = int(sum(eval_mask(q, encoded).sum() for q in workload))
    return LayoutMetrics(
        n_rows=n,
        n_queries=len(workload),
        n_blocks=len(uniq),
        tuples_accessed=int(accessed),
        tuples_selected=selected,
    )
