"""Industry-practice baseline partitioners (paper Sec 7.3).

* :func:`random_partition` — "a partitioner that simply shuffles records
  into fixed-size blocks" (the TPC-H baseline).
* :func:`range_partition` — range partitioning on an ingest-time column
  (the deployed default for the ErrorLog workloads); equivalently, date
  partitioning when the column is the ingest date (Sec 2.2.1).
"""
from __future__ import annotations

import numpy as np


def random_partition(n: int, block_size: int, seed: int = 0) -> np.ndarray:
    """Shuffle ``n`` rows into consecutive blocks of ``block_size``."""
    if block_size < 1:
        raise ValueError("block_size must be >= 1")
    g = np.random.default_rng(seed)
    order = g.permutation(n)
    bids = np.empty(n, dtype=np.int64)
    bids[order] = np.arange(n) // block_size
    return _absorb_runt(bids, n, block_size)


def range_partition(values: np.ndarray, block_size: int) -> np.ndarray:
    """Sort rows by ``values`` (e.g. ingest time) and chunk into blocks."""
    if block_size < 1:
        raise ValueError("block_size must be >= 1")
    n = len(values)
    order = np.argsort(values, kind="stable")
    bids = np.empty(n, dtype=np.int64)
    bids[order] = np.arange(n) // block_size
    return _absorb_runt(bids, n, block_size)


def _absorb_runt(bids: np.ndarray, n: int, block_size: int) -> np.ndarray:
    """Fold a trailing block smaller than ``block_size`` into its neighbour
    so every block respects the minimum-size constraint ``b``."""
    n_blocks = n // block_size
    if n_blocks >= 1 and n % block_size:
        bids[bids == n_blocks] = n_blocks - 1
    return bids
