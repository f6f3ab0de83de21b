"""Table 2, ErrorLog-Int and ErrorLog-Ext rows (construction + access %)."""
import pytest

from repro.baselines.bottom_up import BottomUpConfig, bottom_up_partition
from repro.baselines.simple import range_partition
from repro.core.cost import evaluate_layout
from repro.core.cuts import extract_cuts
from repro.core.greedy import greedy_qdtree
from repro.core.woodblock import WoodblockConfig, woodblock_qdtree
from repro.workloads import asts

from .conftest import BENCH_EPISODES

PAPER = {
    "errlog-int": {"baseline": 100.0, "bottom-up": 100.0, "bottom-up+": 5.6,
                   "greedy": 3.1, "woodblock": 0.4},
    "errlog-ext": {"baseline": 100.0, "bottom-up": 96.9, "bottom-up+": 12.2,
                   "greedy": 1.7, "woodblock": 0.2},
}


def _score(bundle, bids, benchmark, approach):
    m = evaluate_layout(
        bundle.encoded, bids, bundle.schema, asts(bundle.queries), acs=bundle.acs
    )
    benchmark.extra_info["access_pct"] = round(100 * m.access_fraction, 3)
    benchmark.extra_info["paper_pct"] = PAPER[bundle.name].get(approach)
    benchmark.extra_info["n_blocks"] = m.n_blocks
    return m


@pytest.fixture(params=["errlog-int", "errlog-ext"], scope="module")
def bundle(request, errlog_int_bench, errlog_ext_bench):
    return errlog_int_bench if request.param == "errlog-int" else errlog_ext_bench


def test_baseline_range(benchmark, bundle):
    bids = benchmark.pedantic(
        range_partition,
        args=(bundle.encoded[bundle.range_col].to_numpy(), bundle.b),
        rounds=3, iterations=1,
    )
    m = _score(bundle, bids, benchmark, "baseline")
    assert m.access_fraction > 0.5  # range-on-ingest cannot skip


def test_bottom_up_untuned(benchmark, bundle):
    W = asts(bundle.queries)
    cuts = extract_cuts(W)
    res = benchmark.pedantic(
        bottom_up_partition, args=(bundle.encoded, cuts, W, bundle.b),
        kwargs={"cfg": BottomUpConfig()}, rounds=1, iterations=1,
    )
    _score(bundle, res.bids, benchmark, "bottom-up")


def test_bottom_up_tuned(benchmark, bundle):
    W = asts(bundle.queries)
    cuts = extract_cuts(W)
    res = benchmark.pedantic(
        bottom_up_partition, args=(bundle.encoded, cuts, W, bundle.b),
        kwargs={"cfg": BottomUpConfig(selectivity_cap=0.10)}, rounds=1, iterations=1,
    )
    _score(bundle, res.bids, benchmark, "bottom-up+")


def test_greedy(benchmark, bundle):
    W = asts(bundle.queries)
    cuts = extract_cuts(W)
    tree = benchmark.pedantic(
        greedy_qdtree, args=(bundle.encoded, bundle.schema, cuts, W, bundle.b),
        rounds=1, iterations=1,
    )
    m = _score(bundle, tree.route(bundle.encoded), benchmark, "greedy")
    assert m.access_fraction < 0.3


def test_woodblock(benchmark, bundle):
    W = asts(bundle.queries)
    cuts = extract_cuts(W)
    n = len(bundle.encoded)
    sample = bundle.encoded.sample(n=n // 10, random_state=0).reset_index(drop=True)

    def build():
        return woodblock_qdtree(
            sample, bundle.schema, cuts, W, max(2, bundle.b // 10),
            config=WoodblockConfig(episodes=BENCH_EPISODES, seed=0),
        )

    res = benchmark.pedantic(build, rounds=1, iterations=1)
    m = _score(bundle, res.tree.route(bundle.encoded), benchmark, "woodblock")
    assert m.access_fraction < 0.3
