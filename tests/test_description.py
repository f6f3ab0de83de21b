"""Interval + Description: restriction exactness and intersection soundness."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.description import Description, Interval
from repro.core.predicates import AdvPred, And, Or, Pred, eval_mask
from repro.core.schema import infer_schema

OPS = ["<", "<=", ">", ">="]


# ------------------------------------------------------------- Interval
class TestInterval:
    def test_default_full_line(self):
        iv = Interval()
        assert not iv.is_empty()
        assert iv.contains(0) and iv.contains(1e12) and iv.contains(-1e12)

    @pytest.mark.parametrize(
        "op,v,side,probe,expect",
        [
            ("<", 5, True, 4.9, True),
            ("<", 5, True, 5.0, False),
            ("<", 5, False, 5.0, True),
            ("<", 5, False, 4.9, False),
            ("<=", 5, True, 5.0, True),
            ("<=", 5, True, 5.1, False),
            ("<=", 5, False, 5.0, False),
            (">", 5, True, 5.1, True),
            (">", 5, True, 5.0, False),
            (">", 5, False, 5.0, True),
            (">=", 5, True, 5.0, True),
            (">=", 5, False, 5.0, False),
            (">=", 5, False, 4.9, True),
        ],
    )
    def test_restrict_boundary_semantics(self, op, v, side, probe, expect):
        iv = Interval(0, 10).restrict(op, v, side)
        assert iv.contains(probe) is expect

    def test_empty_after_contradiction(self):
        iv = Interval(0, 10).restrict("<", 3, True).restrict(">", 7, True)
        assert iv.is_empty()

    def test_point_interval_openness(self):
        # [5, 5] nonempty; (5, 5] empty
        assert not Interval(5, 5).is_empty()
        assert Interval(5, 5, lo_open=True).is_empty()

    @given(
        lo=st.integers(0, 50),
        width=st.integers(0, 50),
        op=st.sampled_from(OPS),
        v=st.integers(0, 100),
    )
    @settings(max_examples=200, deadline=None)
    def test_intersects_pred_matches_point_check(self, lo, width, op, v):
        """intersects_pred must agree with a dense point-wise ground truth."""
        iv = Interval(lo, lo + width)
        pts = np.linspace(lo, lo + width, 101)
        sat = {"<": pts < v, "<=": pts <= v, ">": pts > v, ">=": pts >= v}[op]
        truth = bool(sat.any())
        # closed interval with integer endpoints: the dense grid is exact
        assert iv.intersects_pred(op, v) == truth

    @given(
        op1=st.sampled_from(OPS), v1=st.integers(0, 20),
        op2=st.sampled_from(OPS), v2=st.integers(0, 20),
        probe=st.integers(0, 20),
    )
    @settings(max_examples=200, deadline=None)
    def test_restrict_equals_predicate_conjunction(self, op1, v1, op2, v2, probe):
        """x ∈ restrict(p1)∧restrict(p2) ⇔ x satisfies p1 ∧ p2."""
        iv = Interval(0, 20).restrict(op1, v1, True).restrict(op2, v2, True)
        def sat(op, v):
            return {"<": probe < v, "<=": probe <= v, ">": probe > v, ">=": probe >= v}[op]
        assert iv.contains(probe) == (sat(op1, v1) and sat(op2, v2))


# ---------------------------------------------------------- Description
@pytest.fixture(scope="module")
def space():
    g = np.random.default_rng(3)
    n = 2000
    pdf = pd.DataFrame(
        {
            "a": g.integers(0, 100, n).astype(float),
            "b": g.integers(0, 100, n).astype(float),
            "c": g.choice(list("pqrs"), n),
        }
    )
    sch = infer_schema(pdf, categorical=["c"], domains={"a": (0, 100), "b": (0, 100)})
    return pdf, sch, sch.encode(pdf)


def test_root_covers_everything(space):
    _, sch, enc = space
    root = Description.root(sch)
    for q in [Pred("a", "<", 50.0), Pred("c", "=", 2), Pred("b", ">=", 99.0)]:
        assert root.may_intersect(q)


def test_restrict_range_both_sides(space):
    _, sch, _ = space
    root = Description.root(sch)
    left = root.restrict(Pred("a", "<", 50.0), True)
    right = root.restrict(Pred("a", "<", 50.0), False)
    assert left.may_intersect(Pred("a", "<", 10.0))
    assert not left.may_intersect(Pred("a", ">=", 50.0))
    assert right.may_intersect(Pred("a", ">=", 50.0))
    assert not right.may_intersect(Pred("a", "<", 50.0))


def test_restrict_categorical(space):
    _, sch, _ = space
    root = Description.root(sch)
    left = root.restrict(Pred("c", "in", frozenset([0, 1])), True)
    right = root.restrict(Pred("c", "in", frozenset([0, 1])), False)
    assert left.may_intersect(Pred("c", "=", 0))
    assert not left.may_intersect(Pred("c", "=", 2))
    assert not right.may_intersect(Pred("c", "=", 0))
    assert right.may_intersect(Pred("c", "in", frozenset([2, 3])))


def test_restrict_eq_categorical(space):
    _, sch, _ = space
    root = Description.root(sch)
    left = root.restrict(Pred("c", "=", 2), True)
    assert left.may_intersect(Pred("c", "=", 2))
    assert not left.may_intersect(Pred("c", "=", 0))


def test_adv_cut_bits(space):
    _, sch, _ = space
    ac = AdvPred("ab", "a", "<", "b")
    root = Description.root(sch, ac_names=("ab",))
    left = root.restrict(ac, True)
    right = root.restrict(ac, False)
    assert left.may_intersect(ac) and not left.may_intersect(ac.negate())
    assert right.may_intersect(ac.negate()) and not right.may_intersect(ac)


def test_restrict_by_negated_adv(space):
    _, sch, _ = space
    ac = AdvPred("ab", "a", "<", "b")
    root = Description.root(sch, ac_names=("ab",))
    child = root.restrict(ac.negate(), True)  # satisfies ¬AC
    assert child.may_intersect(ac.negate()) and not child.may_intersect(ac)


def test_empty_descriptions(space):
    _, sch, _ = space
    root = Description.root(sch)
    dead = root.restrict(Pred("a", "<", 10.0), True).restrict(Pred("a", ">", 20.0), True)
    assert dead.is_empty()
    assert not dead.may_intersect(Pred("b", "<", 100.0))
    nomask = root.restrict(Pred("c", "in", frozenset([0, 1, 2, 3])), False)
    assert nomask.is_empty()


def test_and_or_intersection_logic(space):
    _, sch, _ = space
    root = Description.root(sch)
    left = root.restrict(Pred("a", "<", 50.0), True)
    q_and = And([Pred("a", ">=", 50.0), Pred("b", "<", 10.0)])
    q_or = Or([Pred("a", ">=", 50.0), Pred("b", "<", 10.0)])
    assert not left.may_intersect(q_and)  # one conjunct fails
    assert left.may_intersect(q_or)  # one disjunct passes


def test_copy_is_independent(space):
    _, sch, _ = space
    root = Description.root(sch)
    child = root.restrict(Pred("c", "=", 0), True)
    assert root.may_intersect(Pred("c", "=", 1))
    assert not child.may_intersect(Pred("c", "=", 1))


@given(data=st.data())
@settings(max_examples=100, deadline=None)
def test_soundness_no_false_negatives(space, data):
    """If any row in a cut-defined subspace satisfies q, may_intersect(q) is
    True — the property block skipping correctness rests on."""
    pdf, sch, enc = space
    cuts = [
        (Pred("a", "<", float(data.draw(st.integers(10, 90)))), data.draw(st.booleans())),
        (Pred("b", ">=", float(data.draw(st.integers(10, 90)))), data.draw(st.booleans())),
        (Pred("c", "in", frozenset(data.draw(
            st.sets(st.integers(0, 3), min_size=1, max_size=3)))), data.draw(st.booleans())),
    ]
    desc = Description.root(sch)
    mask = np.ones(len(enc), dtype=bool)
    for cut, side in cuts:
        desc = desc.restrict(cut, side)
        m = eval_mask(cut, enc)
        mask &= m if side else ~m
    q = And(
        [
            Pred("a", data.draw(st.sampled_from(OPS)), float(data.draw(st.integers(0, 100)))),
            Pred("c", "=", data.draw(st.integers(0, 3))),
        ]
    )
    rows_satisfying = mask & eval_mask(q, enc)
    if rows_satisfying.any():
        assert desc.may_intersect(q)
