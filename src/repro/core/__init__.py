"""Qd-tree core: predicates, semantic descriptions, tree, construction."""
