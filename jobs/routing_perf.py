"""Entrypoint for the data/query-routing performance numbers (paper Fig 6).

Measures (a) record-routing throughput through a trained qd-tree
(records/second, vectorised batches — Fig 6a) and (b) the per-query
BID-list routing latency CDF (Fig 6b).

Usage:  python jobs/routing_perf.py [--scale 0.5] [--batch 65536]
"""
import argparse
import time

import numpy as np

from repro.core.cuts import extract_cuts
from repro.core.greedy import greedy_qdtree
from repro.experiments.table2 import make_bundle
from repro.workloads import asts


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=0.5)
    ap.add_argument("--batch", type=int, default=65536)
    args = ap.parse_args()

    bundle = make_bundle("tpch", scale=args.scale)
    W = asts(bundle.queries)
    tree = greedy_qdtree(
        bundle.encoded, bundle.schema, extract_cuts(W), W, bundle.b,
        ac_names=bundle.ac_names,
    )
    print(f"tree: {tree.n_leaves} leaves, depth {tree.depth}")

    n = len(bundle.encoded)
    t0 = time.perf_counter()
    for start in range(0, n, args.batch):
        tree.route(bundle.encoded.iloc[start : start + args.batch])
    dt = time.perf_counter() - t0
    print(f"data routing: {n} records in {dt:.2f}s -> {n / dt:,.0f} records/s")

    lat = []
    for q in W:
        t0 = time.perf_counter()
        tree.query_bids(q)
        lat.append(time.perf_counter() - t0)
    lat_ms = np.sort(np.array(lat) * 1000)
    for pct in (50, 90, 99, 100):
        print(f"query routing p{pct}: {np.percentile(lat_ms, pct):.2f} ms")


if __name__ == "__main__":
    main()
