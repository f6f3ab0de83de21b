"""Random / range baseline partitioners."""
import numpy as np
import pytest

from repro.baselines.simple import random_partition, range_partition


def test_random_block_sizes():
    bids = random_partition(1000, 100, seed=0)
    sizes = np.bincount(bids)
    assert (sizes == 100).all()
    assert len(sizes) == 10


def test_random_runt_absorbed():
    bids = random_partition(1050, 100, seed=0)
    sizes = np.bincount(bids)
    assert sizes.sum() == 1050
    assert (sizes >= 100).all()
    assert sizes.max() == 150


def test_random_deterministic_and_seeded():
    a = random_partition(500, 50, seed=1)
    b = random_partition(500, 50, seed=1)
    c = random_partition(500, 50, seed=2)
    assert (a == b).all()
    assert (a != c).any()


def test_random_is_shuffled():
    bids = random_partition(1000, 100, seed=0)
    # consecutive rows should not all share a block (unlike range chunks)
    assert len(np.unique(bids[:100])) > 3


def test_range_orders_by_value():
    vals = np.array([5.0, 1.0, 9.0, 3.0, 7.0, 2.0])
    bids = range_partition(vals, 2)
    # blocks must be value-contiguous: max(block i) <= min(block i+1)
    for b in range(bids.max()):
        assert vals[bids == b].max() <= vals[bids == b + 1].min()


def test_range_block_sizes_and_runt():
    vals = np.arange(1050)[::-1].astype(float)
    bids = range_partition(vals, 100)
    sizes = np.bincount(bids)
    assert sizes.sum() == 1050
    assert (sizes >= 100).all()


def test_range_stable_for_ties():
    vals = np.zeros(200)
    bids = range_partition(vals, 100)
    assert (np.bincount(bids) == [100, 100]).all()


@pytest.mark.parametrize("fn", [random_partition, range_partition])
def test_rejects_bad_block_size(fn):
    with pytest.raises(ValueError):
        if fn is random_partition:
            fn(10, 0)
        else:
            fn(np.arange(10), 0)


def test_single_block_when_n_less_than_b():
    bids = random_partition(30, 100, seed=0)
    assert (bids == 0).all()
    bids = range_partition(np.arange(30), 100)
    assert (bids == 0).all()
