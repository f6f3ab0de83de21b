"""The qd-tree data structure: routing data and routing queries (Sec 3).

A :class:`QdTree` is a binary tree of :class:`TreeNode`. Internal nodes carry
a cut (a :class:`~repro.core.predicates.Pred` or
:class:`~repro.core.predicates.AdvPred`); the left child satisfies the cut,
the right child its negation. Leaves are blocks, numbered ``0..n_leaves-1``
left-to-right — the block ID (BID) that the dataset is physically
partitioned by.

Data routing is exposed three ways:

* :meth:`QdTree.route` — vectorised over an *encoded* pandas frame (numpy
  masks per node), the path used during construction and for throughput
  benchmarks;
* :meth:`QdTree.routing_column` — a native Catalyst ``Column`` (nested
  ``F.when``) over the *raw* frame, used to add the ``bid`` column for
  ``df.write.partitionBy("bid")`` — pure DataFrame API, no UDFs;
* the same expression doubles as the partitioning *function* required by
  Problem 2 (new tuples route without reshuffling).

Query routing (:meth:`QdTree.query_bids`) scans leaf descriptions and
returns the intersecting BIDs, which callers inject as ``bid IN (...)``
(Sec 3.3).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable, Optional

import numpy as np
import pandas as pd

from .description import Description, Interval
from .predicates import AdvPred, Pred
from .predicates import Node as QueryNode
from .predicates import _NUMPY_OPS, eval_mask, to_spark_column
from .schema import CATEGORICAL, TableSchema


def _eval_cut_idx(cut, cols: dict[str, np.ndarray], idx: np.ndarray) -> np.ndarray:
    """Evaluate a (unary or advanced) cut on rows ``idx`` of a column dict."""
    if isinstance(cut, Pred):
        col = cols[cut.attr][idx]
        if cut.op == "in":
            return np.isin(col, list(cut.value))
        return _NUMPY_OPS[cut.op](col, cut.value)
    if isinstance(cut, AdvPred):
        m = _NUMPY_OPS[cut.op](cols[cut.attr1][idx], cols[cut.attr2][idx])
        return ~m if cut.negated else m
    raise TypeError(f"cuts must be Pred or AdvPred, got {cut!r}")


@dataclass
class TreeNode:
    """One qd-tree node; ``cut is None`` ⇔ leaf."""

    desc: Description
    cut: object = None
    left: Optional["TreeNode"] = None
    right: Optional["TreeNode"] = None
    bid: int = -1  # assigned to leaves by QdTree.finalize
    n_rows: int = 0  # rows routed here (set by route/freeze)

    @property
    def is_leaf(self) -> bool:
        return self.cut is None

    def split(self, cut) -> tuple["TreeNode", "TreeNode"]:
        """Cut this leaf; returns the (left, right) children."""
        assert self.is_leaf, "cannot split an internal node"
        self.cut = cut
        self.left = TreeNode(self.desc.restrict(cut, True))
        self.right = TreeNode(self.desc.restrict(cut, False))
        return self.left, self.right


@dataclass
class QdTree:
    """A finalized qd-tree with contiguous leaf BIDs."""

    root: TreeNode
    schema: TableSchema
    leaves: list[TreeNode] = field(default_factory=list)

    @staticmethod
    def build(root: TreeNode, schema: TableSchema) -> "QdTree":
        """Number leaves left-to-right and wrap into a QdTree."""
        leaves: list[TreeNode] = []

        def visit(n: TreeNode):
            if n.is_leaf:
                n.bid = len(leaves)
                leaves.append(n)
            else:
                visit(n.left)
                visit(n.right)

        visit(root)
        return QdTree(root, schema, leaves)

    @property
    def n_leaves(self) -> int:
        return len(self.leaves)

    @property
    def n_nodes(self) -> int:
        return 2 * len(self.leaves) - 1

    @property
    def depth(self) -> int:
        def d(n: TreeNode) -> int:
            return 1 if n.is_leaf else 1 + max(d(n.left), d(n.right))

        return d(self.root)

    # ------------------------------------------------------------- routing
    def route(self, encoded: pd.DataFrame) -> np.ndarray:
        """BID per row of an encoded frame (vectorised, Sec 3.1)."""
        cols = {c: encoded[c].to_numpy() for c in encoded.columns}
        bids = np.empty(len(encoded), dtype=np.int64)
        idx0 = np.arange(len(encoded))

        def down(node: TreeNode, idx: np.ndarray):
            if node.is_leaf:
                bids[idx] = node.bid
                return
            m = _eval_cut_idx(node.cut, cols, idx)
            down(node.left, idx[m])
            down(node.right, idx[~m])

        down(self.root, idx0)
        return bids

    def routing_column(self):
        """Catalyst expression computing the BID for each raw row."""
        from pyspark.sql import functions as F

        def expr(node: TreeNode):
            if node.is_leaf:
                return F.lit(node.bid)
            return F.when(
                to_spark_column(node.cut, self.schema), expr(node.left)
            ).otherwise(expr(node.right))

        return expr(self.root)

    # ------------------------------------------------------------- queries
    def query_bids(self, query: QueryNode) -> list[int]:
        """BIDs of all leaves whose description may intersect ``query``."""
        return [lf.bid for lf in self.leaves if lf.desc.may_intersect(query)]

    # -------------------------------------------------------------- freeze
    def freeze(self, encoded: pd.DataFrame, acs: dict[str, QueryNode] | None = None) -> None:
        """Tighten leaf descriptions with min-max/actual stats (Sec 3.2).

        Replaces each leaf's range hypercube with the min-max index over its
        routed records, recomputes categorical masks from the distinct values
        actually present, and sets AC bits from the data. ``acs`` maps AC
        name -> its (positive) AdvPred so bits can be evaluated.
        """
        bids = self.route(encoded)
        for lf in self.leaves:
            rows = encoded.iloc[np.flatnonzero(bids == lf.bid)]
            lf.n_rows = len(rows)
            lf.desc = block_description(rows, self.schema, acs or {}, like=lf.desc)

    def leaf_sizes(self, encoded: pd.DataFrame) -> np.ndarray:
        bids = self.route(encoded)
        return np.bincount(bids, minlength=self.n_leaves)


def block_description(
    rows: pd.DataFrame,
    schema: TableSchema,
    acs: dict[str, QueryNode],
    like: Description | None = None,
) -> Description:
    """Min-max + dictionary-mask + AC-bit description of a block's rows.

    This is the uniform block-stats metadata (what a Parquet/zone-map engine
    keeps) used to score *every* layout in Table 2. An empty block yields an
    empty description (prunes everything).
    """
    ranges: dict[str, Interval] = {}
    masks: dict[str, np.ndarray] = {}
    ac_bits: dict[str, tuple[bool, bool]] = {}
    empty = len(rows) == 0
    for name, spec in schema.columns.items():
        if spec.kind == CATEGORICAL:
            m = np.zeros(spec.cardinality, dtype=bool)
            if not empty:
                m[np.unique(rows[name].to_numpy()).astype(int)] = True
            masks[name] = m
        else:
            if empty:
                ranges[name] = Interval(1.0, 0.0)  # empty interval
            else:
                col = rows[name].to_numpy()
                ranges[name] = Interval(float(col.min()), float(col.max()))
    for ac_name, pred in acs.items():
        if empty:
            ac_bits[ac_name] = (False, False)
        else:
            m = eval_mask(pred, rows)
            ac_bits[ac_name] = (bool(m.any()), bool((~m).any()))
    return Description(ranges, masks, ac_bits)
