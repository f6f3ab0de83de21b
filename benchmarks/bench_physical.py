"""Figs 5/7 analogue: physical Spark execution over partitioned Parquet.

Writes the WOODBLOCK qd-tree layout and the baseline layout once per
session, then benchmarks the whole (thinned) workload in each mode:
qd-tree with BID routing, qd-tree *no route*, and baseline. The paper's
claims these reproduce: qd-tree ≫ baseline (1.6–14×), routing ≥ no-route.
"""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.cuts import extract_cuts
from repro.core.greedy import greedy_qdtree
from repro.core.woodblock import WoodblockConfig, woodblock_qdtree
from repro.experiments.physical import run_physical
from repro.spark_io.layout import read_routed
from repro.workloads import asts

from .conftest import BENCH_EPISODES


@pytest.fixture(scope="module")
def physical_setup(spark, tpch_bench, tmp_path_factory):
    """Build a tree, write both layouts, thin the workload to 1/template."""
    from repro.baselines.simple import random_partition
    from repro.spark_io.layout import spark_df_from_raw, write_bid_layout, write_tree_layout

    bundle = tpch_bench
    W = asts(bundle.queries)
    cuts = extract_cuts(W)
    n = len(bundle.encoded)
    sample = bundle.encoded.sample(n=n // 10, random_state=0).reset_index(drop=True)
    res = woodblock_qdtree(
        sample, bundle.schema, cuts, W, max(2, bundle.b // 10),
        ac_names=bundle.ac_names,
        config=WoodblockConfig(episodes=max(10, BENCH_EPISODES // 2), seed=0),
    )
    tree = res.tree
    workdir = str(tmp_path_factory.mktemp("phys"))
    write_tree_layout(
        spark_df_from_raw(spark, bundle.raw, bundle.schema), tree, f"{workdir}/qd"
    )
    write_bid_layout(
        spark, bundle.raw, random_partition(n, bundle.b, 0), bundle.schema,
        f"{workdir}/base",
    )
    seen, queries = set(), []
    for q in bundle.queries:
        if q.template not in seen:
            seen.add(q.template)
            queries.append(q)
    return bundle, tree, workdir, queries


def _run_workload(spark, bundle, queries, path, tree):
    total = 0
    for q in queries:
        df = read_routed(spark, path, q.ast, bundle.schema, tree=tree)
        row = df.agg(F.count(F.lit(1)).alias("n")).collect()[0]
        total += row["n"]
    return total


def test_qdtree_with_routing(benchmark, spark, physical_setup):
    bundle, tree, workdir, queries = physical_setup
    total = benchmark.pedantic(
        _run_workload, args=(spark, bundle, queries, f"{workdir}/qd", tree),
        rounds=2, iterations=1, warmup_rounds=1,
    )
    benchmark.extra_info["rows_matched"] = int(total)


def test_qdtree_no_route(benchmark, spark, physical_setup):
    bundle, tree, workdir, queries = physical_setup
    total = benchmark.pedantic(
        _run_workload, args=(spark, bundle, queries, f"{workdir}/qd", None),
        rounds=2, iterations=1, warmup_rounds=1,
    )
    benchmark.extra_info["rows_matched"] = int(total)


def test_baseline_layout(benchmark, spark, physical_setup):
    bundle, tree, workdir, queries = physical_setup
    total = benchmark.pedantic(
        _run_workload, args=(spark, bundle, queries, f"{workdir}/base", None),
        rounds=2, iterations=1, warmup_rounds=1,
    )
    benchmark.extra_info["rows_matched"] = int(total)


def test_result_counts_identical_across_modes(spark, physical_setup):
    """The three modes must agree on every query's result cardinality."""
    bundle, tree, workdir, queries = physical_setup
    a = _run_workload(spark, bundle, queries, f"{workdir}/qd", tree)
    b = _run_workload(spark, bundle, queries, f"{workdir}/qd", None)
    c = _run_workload(spark, bundle, queries, f"{workdir}/base", None)
    assert a == b == c
