"""Sec 7.4 robustness: a qd-tree built on 'train' query seeds keeps its
skipping power on a test set with unseen literals (same templates)."""
import numpy as np
import pytest

from repro.core.cost import evaluate_layout
from repro.workloads import asts, tpch


@pytest.fixture(scope="module")
def test_workload(tpch_bundle):
    # fresh seeds -> new literals for every template (paper's 10x test set,
    # scaled down)
    return tpch.workload(tpch_bundle.schema, n_seeds=2, seed=999)


def test_unseen_literals_access_fraction_close(tpch_bundle, tpch_tree, test_workload):
    enc, sch, acs = tpch_bundle.encoded, tpch_bundle.schema, tpch_bundle.acs
    bids = tpch_tree.route(enc)
    train = evaluate_layout(enc, bids, sch, asts(tpch_bundle.queries), acs=acs)
    test = evaluate_layout(enc, bids, sch, asts(test_workload), acs=acs)
    # paper: mean runtime on the 10x unseen set within ~0.3% of train; at
    # our scale allow a 2x band on the access fraction
    assert test.access_fraction < 2.0 * train.access_fraction + 0.05


def test_unseen_still_beats_random(tpch_bundle, tpch_tree, test_workload):
    from repro.baselines.simple import random_partition

    enc, sch, acs = tpch_bundle.encoded, tpch_bundle.schema, tpch_bundle.acs
    W = asts(test_workload)
    tree_m = evaluate_layout(enc, tpch_tree.route(enc), sch, W, acs=acs)
    rand_m = evaluate_layout(enc, random_partition(len(enc), 150, 0), sch, W, acs=acs)
    assert tree_m.access_fraction < rand_m.access_fraction


def test_routing_function_applies_to_new_data(tpch_bundle, tpch_tree):
    """Problem 2: the partitioning function routes newly ingested tuples
    (same distribution, different seed) without reshuffling."""
    new_raw = tpch.denormalized(sf=0.005, seed=123)
    new_enc = tpch_bundle.schema.encode(new_raw)
    bids = tpch_tree.route(new_enc)
    assert len(bids) == len(new_enc)
    assert set(np.unique(bids)) <= set(range(tpch_tree.n_leaves))
    # every leaf keeps receiving data under the same distribution
    assert len(np.unique(bids)) > tpch_tree.n_leaves * 0.5
