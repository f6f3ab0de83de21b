"""Fig 6 analogue: data-routing throughput and query-routing latency."""
import numpy as np
import pytest

from repro.core.cuts import extract_cuts
from repro.core.greedy import greedy_qdtree
from repro.workloads import asts


@pytest.fixture(scope="module")
def tree(tpch_bench):
    W = asts(tpch_bench.queries)
    return greedy_qdtree(
        tpch_bench.encoded, tpch_bench.schema, extract_cuts(W), W, tpch_bench.b,
        ac_names=tpch_bench.ac_names,
    )


def test_data_routing_throughput(benchmark, tpch_bench, tree):
    """Records/second through vectorised batch routing (paper Fig 6a:
    ~400K rec/s at 64 threads in their Python prototype)."""
    batch = tpch_bench.encoded.head(65536)

    result = benchmark(tree.route, batch)
    assert len(result) == len(batch)
    benchmark.extra_info["records_per_s"] = round(len(batch) / benchmark.stats["mean"])
    benchmark.extra_info["n_leaves"] = tree.n_leaves


def test_query_routing_latency(benchmark, tpch_bench, tree):
    """Per-query BID-list computation (paper Fig 6b: <16 ms max)."""
    W = asts(tpch_bench.queries)

    def route_all():
        return [tree.query_bids(q) for q in W]

    bid_lists = benchmark(route_all)
    assert len(bid_lists) == len(W)
    per_query_ms = 1000 * benchmark.stats["mean"] / len(W)
    benchmark.extra_info["mean_per_query_ms"] = round(per_query_ms, 3)
    assert per_query_ms < 100  # sanity: well under interactive budget
