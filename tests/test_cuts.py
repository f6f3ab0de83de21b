"""Candidate-cut extraction (Sec 3.4)."""
from repro.core.cuts import ac_map, extract_cuts
from repro.core.predicates import AdvPred, And, Or, Pred
from repro.workloads import asts


def test_extracts_all_unary_preds():
    q = And([Pred("a", "<", 10), Or([Pred("b", ">", 90), Pred("c", "in", frozenset([0, 4]))])])
    cuts = extract_cuts([q])
    assert cuts == [Pred("a", "<", 10), Pred("b", ">", 90), Pred("c", "in", frozenset([0, 4]))]


def test_dedup_across_queries():
    p = Pred("a", "<", 10)
    cuts = extract_cuts([p, And([p, Pred("b", ">", 1)]), p])
    assert cuts.count(p) == 1
    assert len(cuts) == 2


def test_order_is_first_appearance():
    q1 = Pred("b", ">", 1)
    q2 = Pred("a", "<", 10)
    assert extract_cuts([q1, q2]) == [q1, q2]


def test_advanced_cuts_extracted_positive():
    ac = AdvPred("x", "a", "<", "b")
    cuts = extract_cuts([And([ac.negate(), Pred("a", "<", 1)])])
    assert ac in cuts
    assert ac.negate() not in cuts


def test_advanced_cuts_can_be_disabled():
    ac = AdvPred("x", "a", "<", "b")
    cuts = extract_cuts([And([ac, Pred("a", "<", 1)])], advanced=False)
    assert cuts == [Pred("a", "<", 1)]


def test_ac_map():
    ac = AdvPred("x", "a", "<", "b")
    m = ac_map([And([ac.negate(), Pred("a", "<", 1)]), ac])
    assert m == {"x": ac}


def test_tpch_cut_count_in_paper_range(tpch_bundle, tpch_cuts):
    """Paper: 'a few hundreds to low thousands of candidate cuts'."""
    assert 30 <= len(tpch_cuts) <= 2000
    names = {c.name for c in tpch_cuts if isinstance(c, AdvPred)}
    assert names == set(tpch_bundle.ac_names)


def test_cuts_unique(tpch_cuts):
    assert len(tpch_cuts) == len(set(tpch_cuts))
