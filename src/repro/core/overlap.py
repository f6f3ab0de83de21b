"""Data overlap: trading storage for skipping (paper Sec 6.2, Fig 4).

Mechanism, as the paper describes it:

1. Construct a qd-tree with a *relaxed* cutting condition — one of the two
   children may be smaller than ``b`` (``greedy_qdtree(..., relaxed=True)``).
   The Fig-4 "lucky" (N+1)-record block then gets cut once more into an
   N-record block and a singleton block.
2. Partition the leaves into small (< b) and large (≥ b). Replicate each
   small block into its *neighbor* large blocks — blocks whose hypercubes
   share all dimension boundaries except one, where the intervals are
   adjacent. The enlarged neighbor's semantic description is extended
   along that dimension, so completeness is preserved.
3. At query time the candidate set is every block intersecting the query;
   completeness lets us prune redundancy — if a candidate block's region
   *covers* the whole query region, that block alone suffices and the
   smallest such block is scanned.

The cost metric charges a query the sizes of the blocks it scans
(including replicated copies), and the layout reports its extra-storage
cost, which for Fig-4-style workloads is near zero.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Sequence

import numpy as np
import pandas as pd

from .description import Description, Interval
from .predicates import AdvPred, And, Node, Or, Pred
from .qdtree import QdTree
from .schema import CATEGORICAL, TableSchema


# --------------------------------------------------------------- coverage
def covers(desc: Description, q: Node, schema: TableSchema) -> bool:
    """Sound check that every tuple satisfying ``q`` lies inside ``desc``.

    Conservative: may return False for a covering block (we then scan a
    few redundant blocks — correct, just less efficient), never True for
    a non-covering one. Handles conjunctions of unary predicates exactly;
    an OR covers iff every disjunct is covered; advanced cuts require the
    description side to be unrestricted or implied by the query.
    """
    if isinstance(q, Or):
        return all(covers(desc, c, schema) for c in q.children)
    preds = _flatten_conjunction(q)
    if preds is None:
        return False
    range_constraints: dict[str, Interval] = {}
    cat_constraints: dict[str, np.ndarray] = {}
    ac_constraints: dict[str, bool] = {}
    for p in preds:
        if isinstance(p, AdvPred):
            name, val = p.name, not p.negated
            if name in ac_constraints and ac_constraints[name] != val:
                return True  # contradictory query selects nothing
            ac_constraints[name] = val
        elif p.op in ("=", "in"):
            spec = schema[p.attr]
            sel = np.zeros(spec.cardinality, dtype=bool)
            vals = p.value if p.op == "in" else frozenset([p.value])
            sel[[int(v) for v in vals]] = True
            cat_constraints[p.attr] = (
                cat_constraints[p.attr] & sel if p.attr in cat_constraints else sel
            )
        else:
            iv = range_constraints.get(p.attr, _domain_interval(schema, p.attr))
            range_constraints[p.attr] = iv.restrict(p.op, float(p.value), True)

    for col, iv in desc.ranges.items():
        qiv = range_constraints.get(col, _domain_interval(schema, col))
        if not _interval_contains(iv, qiv):
            return False
    for col, mask in desc.masks.items():
        qmask = cat_constraints.get(
            col, np.ones(schema[col].cardinality, dtype=bool)
        )
        if (qmask & ~mask).any():
            return False
    for name, (mt, mf) in desc.acs.items():
        want = ac_constraints.get(name)
        if want is None:
            if not (mt and mf):
                return False  # query unconstrained but block excludes a side
        elif want and not mt:
            return False
        elif not want and not mf:
            return False
    return True


def _flatten_conjunction(q: Node):
    """Leaf predicates of a pure conjunction, or None if q contains OR."""
    if isinstance(q, (Pred, AdvPred)):
        return [q]
    if isinstance(q, And):
        out = []
        for c in q.children:
            sub = _flatten_conjunction(c)
            if sub is None:
                return None
            out.extend(sub)
        return out
    return None


def _domain_interval(schema: TableSchema, col: str) -> Interval:
    lo, hi = schema[col].domain
    return Interval(float(lo), float(hi))


def _interval_contains(outer: Interval, inner: Interval) -> bool:
    if inner.is_empty():
        return True
    if inner.lo < outer.lo or (inner.lo == outer.lo and outer.lo_open and not inner.lo_open):
        return False
    if inner.hi > outer.hi or (inner.hi == outer.hi and outer.hi_open and not inner.hi_open):
        return False
    return True


# -------------------------------------------------------------- neighbors
def are_neighbors(a: Description, b: Description) -> bool:
    """Hypercubes sharing N−1 dimension boundaries, adjacent in the last
    (paper's neighbor definition); categorical masks must match."""
    for col, ma in a.masks.items():
        if not np.array_equal(ma, b.masks[col]):
            return False
    if a.acs != b.acs:
        return False
    differing = [c for c in a.ranges if a.ranges[c] != b.ranges[c]]
    if len(differing) != 1:
        return False
    ia, ib = a.ranges[differing[0]], b.ranges[differing[0]]
    return _adjacent(ia, ib) or _adjacent(ib, ia)


def _adjacent(lo_iv: Interval, hi_iv: Interval) -> bool:
    # [x, v) followed by [v, y) (openness complementary at the shared cut)
    return lo_iv.hi == hi_iv.lo and (lo_iv.hi_open != hi_iv.lo_open)


def _merge_along(a: Description, b: Description) -> Description:
    """Union hull of two neighbor descriptions (extends one interval)."""
    out = a.copy()
    for col, iv in a.ranges.items():
        jv = b.ranges[col]
        if iv != jv:
            out.ranges[col] = Interval(
                min(iv.lo, jv.lo),
                max(iv.hi, jv.hi),
                iv.lo_open if iv.lo <= jv.lo else jv.lo_open,
                iv.hi_open if iv.hi >= jv.hi else jv.hi_open,
            )
    return out


# ----------------------------------------------------------------- layout
@dataclass
class OverlapBlock:
    """One physical block: the *region* is its complete semantic
    description (conjunction-of-cuts hull — every matching tuple is in the
    block), the *stats* description is the tightened min-max/dictionary
    metadata used for skipping. Keeping both mirrors the paper's Sec 3.2:
    min-max indexes tighten, semantic descriptions stay complete."""

    bid: int
    region: Description
    stats: Description
    rows: np.ndarray  # row indices (copies included)

    @property
    def size(self) -> int:
        return len(self.rows)


@dataclass
class OverlapLayout:
    blocks: list[OverlapBlock]
    n_rows: int
    extra_rows: int  # replicated tuples (storage overhead)

    def query_blocks(self, q: Node, schema: TableSchema) -> list[int]:
        """Intersecting blocks (by min-max stats), with completeness-based
        redundancy pruning: if some candidate's complete region covers the
        whole query region, that candidate alone suffices — scan the
        smallest such block (Sec 6.2.1)."""
        cands = [blk for blk in self.blocks if blk.stats.may_intersect(q)]
        covering = [blk for blk in cands if covers(blk.region, q, schema)]
        if covering:
            best = min(covering, key=lambda blk: blk.size)
            return [best.bid]
        return [blk.bid for blk in cands]

    def tuples_accessed(self, workload: Sequence[Node], schema: TableSchema) -> int:
        size_of = {blk.bid: blk.size for blk in self.blocks}
        return sum(
            sum(size_of[bid] for bid in self.query_blocks(q, schema))
            for q in workload
        )

    def access_fraction(self, workload: Sequence[Node], schema: TableSchema) -> float:
        return self.tuples_accessed(workload, schema) / (
            self.n_rows * len(workload)
        )


def build_overlap_layout(
    tree: QdTree, encoded: pd.DataFrame, b: int, acs: dict | None = None
) -> OverlapLayout:
    """Replicate each small (< b) leaf of a relaxed-construction tree into
    every neighbor large leaf, enlarging the neighbors' regions (Sec 6.2).
    Min-max stats are then recomputed from each block's final rows."""
    from .qdtree import block_description

    bids = tree.route(encoded)
    blocks = [
        OverlapBlock(
            lf.bid, lf.desc.copy(), lf.desc, np.flatnonzero(bids == lf.bid)
        )
        for lf in tree.leaves
    ]
    small = [blk for blk in blocks if blk.size < b]
    large = [blk for blk in blocks if blk.size >= b]
    extra = 0
    for s in small:
        for g in large:
            # neighbor test against the large block's ORIGINAL description
            if are_neighbors(s.region, tree.leaves[g.bid].desc):
                g.region = _merge_along(g.region, s.region)
                g.rows = np.concatenate([g.rows, s.rows])
                extra += s.size
    for blk in blocks:  # tighten skipping stats from the final contents
        blk.stats = block_description(
            encoded.iloc[blk.rows], tree.schema, acs or {}
        )
    return OverlapLayout(blocks=blocks, n_rows=len(encoded), extra_rows=extra)
