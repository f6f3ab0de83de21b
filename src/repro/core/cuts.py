"""Candidate-cut extraction from a workload (Sec 3.4, 6.1).

The search space for every construction algorithm is the set of *pushed-down
unary predicates* of the target workload, plus any declared advanced
(binary) cuts. Duplicates are removed; order is deterministic (first
appearance) so construction is reproducible across runs.
"""
from __future__ import annotations

from typing import Iterable, Sequence

from .predicates import AdvPred, Node, Pred, iter_adv_preds, iter_unary_preds


def extract_cuts(
    workload: Sequence[Node], advanced: bool = True
) -> list[Pred | AdvPred]:
    """All distinct unary predicates (and ACs) appearing in ``workload``."""
    seen: set = set()
    out: list[Pred | AdvPred] = []
    for q in workload:
        for p in iter_unary_preds(q):
            if p not in seen:
                seen.add(p)
                out.append(p)
        if advanced:
            for a in iter_adv_preds(q):
                pos = a.negate() if a.negated else a
                if pos not in seen:
                    seen.add(pos)
                    out.append(pos)
    return out


def ac_map(workload: Sequence[Node]) -> dict[str, AdvPred]:
    """AC name -> positive AdvPred, for every advanced cut in the workload."""
    out: dict[str, AdvPred] = {}
    for q in workload:
        for a in iter_adv_preds(q):
            pos = a.negate() if a.negated else a
            out.setdefault(pos.name, pos)
    return out
