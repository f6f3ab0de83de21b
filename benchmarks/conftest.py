"""Bench-scale fixtures (DESIGN.md §5).

Default bench scale is 0.5× the paper-proportional default (TPC-H 300k
rows / b=1500, ErrorLogs 150k rows / b=1000) so the whole benchmark suite
finishes in tens of minutes; override with REPRO_BENCH_SCALE=1.0 for the
full runs recorded in EXPERIMENTS.md (also reproducible via
``python jobs/table2.py --scale 1.0``).
"""
import os

import pytest

from repro.experiments.table2 import make_bundle

BENCH_SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "0.5"))
BENCH_EPISODES = int(os.environ.get("REPRO_BENCH_EPISODES", "40"))


@pytest.fixture(scope="session")
def tpch_bench():
    return make_bundle("tpch", scale=BENCH_SCALE, n_seeds=10)


@pytest.fixture(scope="session")
def errlog_int_bench():
    return make_bundle("errlog-int", scale=BENCH_SCALE, n_queries=200)


@pytest.fixture(scope="session")
def errlog_ext_bench():
    return make_bundle("errlog-ext", scale=BENCH_SCALE, n_queries=200)
