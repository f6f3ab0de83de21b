"""Table 2, TPC-H row: construction time + logical access % per approach.

Each benchmark builds one layout (pedantic: a single round — construction
is minutes-scale) and attaches the measured %-tuples-accessed as
``extra_info`` so ``--benchmark-only`` output carries the Table 2 numbers
next to the construction times (paper Sec 7.6 discusses those times).
"""
import numpy as np
import pytest

from repro.baselines.bottom_up import BottomUpConfig, bottom_up_partition
from repro.baselines.simple import random_partition
from repro.core.cost import evaluate_layout
from repro.core.cuts import extract_cuts
from repro.core.greedy import greedy_qdtree
from repro.core.woodblock import WoodblockConfig, woodblock_qdtree
from repro.workloads import asts

from .conftest import BENCH_EPISODES

PAPER = {"baseline": 56.0, "bottom-up": 46.1, "greedy": 26.3, "woodblock": 25.8}


def _score(bundle, bids, benchmark, approach):
    m = evaluate_layout(
        bundle.encoded, bids, bundle.schema, asts(bundle.queries), acs=bundle.acs
    )
    benchmark.extra_info["access_pct"] = round(100 * m.access_fraction, 2)
    benchmark.extra_info["paper_pct"] = PAPER.get(approach)
    benchmark.extra_info["n_blocks"] = m.n_blocks
    benchmark.extra_info["selectivity_pct"] = round(100 * m.selectivity, 2)
    return m


def test_baseline_random(benchmark, tpch_bench):
    bids = benchmark.pedantic(
        random_partition, args=(len(tpch_bench.encoded), tpch_bench.b),
        kwargs={"seed": 0}, rounds=3, iterations=1,
    )
    m = _score(tpch_bench, bids, benchmark, "baseline")
    assert m.access_fraction > 0.5


def test_bottom_up(benchmark, tpch_bench):
    W = asts(tpch_bench.queries)
    cuts = extract_cuts(W)
    res = benchmark.pedantic(
        bottom_up_partition, args=(tpch_bench.encoded, cuts, W, tpch_bench.b),
        kwargs={"cfg": BottomUpConfig()}, rounds=1, iterations=1,
    )
    _score(tpch_bench, res.bids, benchmark, "bottom-up")


def test_greedy(benchmark, tpch_bench):
    W = asts(tpch_bench.queries)
    cuts = extract_cuts(W)
    tree = benchmark.pedantic(
        greedy_qdtree,
        args=(tpch_bench.encoded, tpch_bench.schema, cuts, W, tpch_bench.b),
        kwargs={"ac_names": tpch_bench.ac_names}, rounds=1, iterations=1,
    )
    m = _score(tpch_bench, tree.route(tpch_bench.encoded), benchmark, "greedy")
    assert m.access_fraction < 0.5


def test_woodblock(benchmark, tpch_bench):
    W = asts(tpch_bench.queries)
    cuts = extract_cuts(W)
    n = len(tpch_bench.encoded)
    sample = tpch_bench.encoded.sample(n=n // 10, random_state=0).reset_index(drop=True)

    def build():
        return woodblock_qdtree(
            sample, tpch_bench.schema, cuts, W, max(2, tpch_bench.b // 10),
            ac_names=tpch_bench.ac_names,
            config=WoodblockConfig(episodes=BENCH_EPISODES, seed=0),
        )

    res = benchmark.pedantic(build, rounds=1, iterations=1)
    m = _score(tpch_bench, res.tree.route(tpch_bench.encoded), benchmark, "woodblock")
    assert m.access_fraction < 0.5
