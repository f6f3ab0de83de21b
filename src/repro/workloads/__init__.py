"""Benchmark datasets + query workloads (paper Sec 7.2).

Each workload module exposes a deterministic generator returning a raw
pandas frame, a :class:`~repro.core.schema.TableSchema` builder, and a
query-workload generator returning :class:`Query` objects (template name +
predicate AST in encoded literal space).
"""
from dataclasses import dataclass

from ..core.predicates import Node


@dataclass(frozen=True)
class Query:
    """A workload query: its template name and its filter AST."""

    template: str
    ast: Node


def asts(queries) -> list:
    """The bare predicate ASTs of a query list (what the cost model eats)."""
    return [q.ast for q in queries]
