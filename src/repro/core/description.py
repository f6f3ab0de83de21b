"""Semantic descriptions of qd-tree nodes (paper Table 1 + Sec 6.1).

A node's description has three parts:

* ``ranges`` — per numeric/date column, an :class:`Interval` with exact
  open/closed bounds (the paper's ``n.range`` hypercube);
* ``masks`` — per categorical column, a ``|Dom|``-bit boolean vector
  (``n.categorical_mask``): bit 0 ⇒ that value definitively absent;
* ``acs`` — per advanced cut, a ``(may_true, may_false)`` pair. The paper
  stores one "may contain satisfying rows" bit; we keep the complementary
  bit too so the ¬AC side of a cut can also prune queries.

The two operations that matter:

* :meth:`Description.restrict` — apply a cut (or its negation) to produce a
  child description; this is how routing-tree semantics are propagated.
* :meth:`Description.may_intersect` — sound intersection test against a
  query AST: it may return ``True`` for a block with no matching rows
  (false positive ⇒ wasted scan) but never ``False`` for a block that
  contains a matching row (which would lose results).
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

import numpy as np

from .predicates import AdvPred, And, Or, Pred
from .schema import CATEGORICAL, TableSchema


@dataclass(frozen=True)
class Interval:
    """Real-line interval with independently open/closed endpoints."""

    lo: float = -math.inf
    hi: float = math.inf
    lo_open: bool = False
    hi_open: bool = False

    def is_empty(self) -> bool:
        if self.lo > self.hi:
            return True
        return self.lo == self.hi and (self.lo_open or self.hi_open)

    # -- restriction by a unary range predicate ---------------------------
    def restrict(self, op: str, v: float, side: bool) -> "Interval":
        """Interval of points additionally satisfying ``x op v`` (side=True)
        or its negation (side=False)."""
        if not side:
            op = {"<": ">=", "<=": ">", ">": "<=", ">=": "<"}[op]
        lo, hi, lo_o, hi_o = self.lo, self.hi, self.lo_open, self.hi_open
        if op == "<":
            if v < hi or (v == hi and not hi_o):
                hi, hi_o = v, True
        elif op == "<=":
            if v < hi:
                hi, hi_o = v, False
        elif op == ">":
            if v > lo or (v == lo and not lo_o):
                lo, lo_o = v, True
        elif op == ">=":
            if v > lo:
                lo, lo_o = v, False
        return Interval(lo, hi, lo_o, hi_o)

    # -- intersection with a unary range predicate ------------------------
    def intersects_pred(self, op: str, v: float) -> bool:
        """Does the interval contain any point satisfying ``x op v``?"""
        if self.is_empty():
            return False
        if op == "<":  # need a point strictly below v
            return self.lo < v
        if op == "<=":
            return self.lo < v or (self.lo == v and not self.lo_open)
        if op == ">":
            return self.hi > v
        if op == ">=":
            return self.hi > v or (self.hi == v and not self.hi_open)
        raise ValueError(op)

    def contains(self, x: float) -> bool:
        if x < self.lo or x > self.hi:
            return False
        if x == self.lo and self.lo_open:
            return False
        if x == self.hi and self.hi_open:
            return False
        return True


@dataclass
class Description:
    """Semantic description of a node's subspace."""

    ranges: dict[str, Interval] = field(default_factory=dict)
    masks: dict[str, np.ndarray] = field(default_factory=dict)
    acs: dict[str, tuple[bool, bool]] = field(default_factory=dict)

    # ------------------------------------------------------------- factory
    @staticmethod
    def root(schema: TableSchema, ac_names: tuple[str, ...] = ()) -> "Description":
        """Whole-table description: full domains, all-ones masks, (1,1) ACs."""
        ranges = {}
        masks = {}
        for name, spec in schema.columns.items():
            if spec.kind == CATEGORICAL:
                masks[name] = np.ones(spec.cardinality, dtype=bool)
            else:
                lo, hi = spec.domain
                ranges[name] = Interval(float(lo), float(hi))
        acs = {n: (True, True) for n in ac_names}
        return Description(ranges, masks, acs)

    def copy(self) -> "Description":
        return Description(dict(self.ranges), dict(self.masks), dict(self.acs))

    # ------------------------------------------------------------ restrict
    def restrict(self, cut, side: bool) -> "Description":
        """Child description after applying ``cut`` (True) or ``¬cut`` (False)."""
        out = self.copy()
        if isinstance(cut, Pred):
            if cut.op == "in" or cut.op == "=":
                vals = cut.value if cut.op == "in" else frozenset([cut.value])
                mask = self.masks[cut.attr]
                sel = np.zeros_like(mask)
                sel[[int(v) for v in vals]] = True
                out.masks[cut.attr] = mask & sel if side else mask & ~sel
            else:
                out.ranges[cut.attr] = self.ranges[cut.attr].restrict(
                    cut.op, float(cut.value), side
                )
        elif isinstance(cut, AdvPred):
            if cut.negated:
                cut, side = cut.negate(), not side
            mt, mf = self.acs[cut.name]
            out.acs[cut.name] = (mt, False) if side else (False, mf)
        else:
            raise TypeError(f"cannot restrict by {cut!r}")
        return out

    def is_empty(self) -> bool:
        return (
            any(iv.is_empty() for iv in self.ranges.values())
            or any(not m.any() for m in self.masks.values())
            or any(not mt and not mf for mt, mf in self.acs.values())
        )

    # ----------------------------------------------------------- intersect
    def may_intersect(self, query) -> bool:
        """Sound test: could any tuple in this subspace satisfy ``query``?

        AND intersects iff all conjuncts do; OR iff any disjunct does
        (Sec 3.3). This is the standard conservative approximation.
        """
        if self.is_empty():
            return False
        return self._intersect(query)

    def _intersect(self, q) -> bool:
        if isinstance(q, Pred):
            if q.op in ("=", "in"):
                mask = self.masks[q.attr]
                vals = q.value if q.op == "in" else frozenset([q.value])
                return bool(mask[[int(v) for v in vals]].any())
            return self.ranges[q.attr].intersects_pred(q.op, float(q.value))
        if isinstance(q, AdvPred):
            mt, mf = self.acs[q.name]
            return mf if q.negated else mt
        if isinstance(q, And):
            return all(self._intersect(c) for c in q.children)
        if isinstance(q, Or):
            return any(self._intersect(c) for c in q.children)
        raise TypeError(f"unknown query node {q!r}")
