"""QdTree: routing partition/completeness, query routing, freeze."""
import pickle

import numpy as np
import pytest

from repro.core.cost import evaluate_layout
from repro.core.description import Description
from repro.core.predicates import And, Pred, eval_mask
from repro.core.qdtree import QdTree, TreeNode, block_description
from repro.core.schema import infer_schema
from repro.workloads import asts


@pytest.fixture(scope="module")
def manual_tree(tiny2d_module):
    pdf, sch, enc = tiny2d_module
    root = TreeNode(Description.root(sch))
    l, r = root.split(Pred("cpu", "<", 50.0))
    l.split(Pred("disk", "<", 0.5))
    return QdTree.build(root, sch), enc


@pytest.fixture(scope="module")
def tiny2d_module():
    import pandas as pd

    g = np.random.default_rng(0)
    n = 5000
    pdf = pd.DataFrame({"cpu": g.random(n) * 100, "disk": g.random(n)})
    sch = infer_schema(pdf, domains={"cpu": (0.0, 100.0), "disk": (0.0, 1.0)})
    return pdf, sch, sch.encode(pdf)


def test_build_numbers_leaves_left_to_right(manual_tree):
    tree, _ = manual_tree
    assert tree.n_leaves == 3
    assert [lf.bid for lf in tree.leaves] == [0, 1, 2]
    assert tree.n_nodes == 5
    assert tree.depth == 3


def test_route_is_a_partition(manual_tree):
    tree, enc = manual_tree
    bids = tree.route(enc)
    assert len(bids) == len(enc)
    assert set(np.unique(bids)) <= set(range(tree.n_leaves))


def test_route_matches_semantics(manual_tree):
    tree, enc = manual_tree
    bids = tree.route(enc)
    cpu, disk = enc.cpu.to_numpy(), enc.disk.to_numpy()
    assert (bids[(cpu < 50) & (disk < 0.5)] == 0).all()
    assert (bids[(cpu < 50) & (disk >= 0.5)] == 1).all()
    assert (bids[cpu >= 50] == 2).all()


def test_completeness_every_row_satisfies_its_leaf(manual_tree):
    """The completeness property: a leaf holds ALL rows matching its
    description, i.e. each row's leaf description admits the row and no
    other leaf's does."""
    tree, enc = manual_tree
    bids = tree.route(enc)
    for lf in tree.leaves:
        in_leaf = bids == lf.bid
        # evaluate the leaf's range description as a data predicate; for a
        # pure range tree it must coincide exactly with leaf membership
        m = np.ones(len(enc), dtype=bool)
        for col, iv in lf.desc.ranges.items():
            v = enc[col].to_numpy()
            m &= (v > iv.lo) | ((not iv.lo_open) & (v == iv.lo))
            m &= (v < iv.hi) | ((not iv.hi_open) & (v == iv.hi))
        assert (m == in_leaf).all()


def test_query_bids_sound(manual_tree):
    """No false negatives: every block containing a matching row is listed."""
    tree, enc = manual_tree
    bids = tree.route(enc)
    for q in [
        Pred("cpu", "<", 10.0),
        Pred("disk", ">=", 0.9),
        And([Pred("cpu", ">=", 50.0), Pred("disk", "<", 0.2)]),
    ]:
        hit_blocks = set(np.unique(bids[eval_mask(q, enc)]))
        assert hit_blocks <= set(tree.query_bids(q))


def test_query_bids_prunes(manual_tree):
    tree, _ = manual_tree
    assert set(tree.query_bids(Pred("cpu", ">=", 50.0))) == {2}
    assert set(tree.query_bids(And([Pred("cpu", "<", 50.0), Pred("disk", "<", 0.4)]))) == {0}


def test_leaf_sizes(manual_tree):
    tree, enc = manual_tree
    sizes = tree.leaf_sizes(enc)
    assert sizes.sum() == len(enc)
    assert len(sizes) == 3


def test_freeze_tightens(manual_tree):
    tree, enc = manual_tree
    before = [dict(lf.desc.ranges) for lf in tree.leaves]
    tree.freeze(enc)
    for lf, old in zip(tree.leaves, before):
        for col, iv in lf.desc.ranges.items():
            assert iv.lo >= old[col].lo - 1e-9
            assert iv.hi <= old[col].hi + 1e-9
        assert lf.n_rows > 0
    # soundness preserved after freeze
    bids = tree.route(enc)
    q = And([Pred("cpu", "<", 30.0), Pred("disk", ">", 0.8)])
    hit = set(np.unique(bids[eval_mask(q, enc)]))
    assert hit <= set(tree.query_bids(q))


def test_block_description_empty_block(tiny2d_module):
    import pandas as pd

    _, sch, enc = tiny2d_module
    d = block_description(enc.iloc[0:0], sch, {})
    assert d.is_empty()
    assert not d.may_intersect(Pred("cpu", "<", 100.0))


def test_split_guard(manual_tree):
    tree, _ = manual_tree
    with pytest.raises(AssertionError):
        tree.root.split(Pred("cpu", "<", 10.0))


def test_pickle_roundtrip(manual_tree):
    tree, enc = manual_tree
    tree2 = pickle.loads(pickle.dumps(tree))
    assert (tree2.route(enc) == tree.route(enc)).all()
    assert tree2.n_leaves == tree.n_leaves


def test_route_deterministic(manual_tree):
    tree, enc = manual_tree
    assert (tree.route(enc) == tree.route(enc)).all()
