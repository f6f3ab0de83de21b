"""run_physical harness at tiny scale: modes agree, metrics populated."""
import numpy as np
import pytest

from repro.baselines.simple import random_partition
from repro.experiments.physical import format_physical, run_physical


@pytest.fixture(scope="module")
def phys(spark, tpch_bundle, tpch_tree, tmp_path_factory):
    queries = tpch_bundle.queries[:4]
    baseline = random_partition(len(tpch_bundle.raw), 2000, seed=0)
    workdir = str(tmp_path_factory.mktemp("phys_tiny"))
    return run_physical(
        spark, tpch_bundle, tpch_tree, baseline, workdir, queries=queries
    )


def test_all_modes_timed(phys):
    for template, modes in phys.per_template.items():
        assert set(modes) == {"qdtree", "qdtree-noroute", "baseline"}
        for times in modes.values():
            assert all(t > 0 for t in times)


def test_totals_summed(phys):
    assert set(phys.totals) == {"qdtree", "qdtree-noroute", "baseline"}
    for v in phys.totals.values():
        assert v > 0


def test_rows_routed_recorded(phys, tpch_bundle):
    assert sum(phys.rows_routed.values()) > 0
    # routed rows can never exceed (queries x full table)
    assert sum(phys.rows_routed.values()) <= 4 * len(tpch_bundle.raw)


def test_format_physical(phys):
    s = format_physical(phys)
    assert "qdtree" in s and "total" in s and "ms" in s


def test_errlog_probe_is_summable(errlog_int_bundle):
    """Regression: the aggregate probe must skip DATE columns (Spark cannot
    sum a DateType; ErrorLog's first schema column is a date)."""
    from repro.core.schema import NUMERIC
    from repro.experiments.physical import _numeric_probe

    probe = _numeric_probe(errlog_int_bundle)
    assert errlog_int_bundle.schema[probe].kind == NUMERIC


def test_run_physical_on_errlog(spark, errlog_int_bundle, tmp_path_factory):
    from repro.core.cuts import extract_cuts
    from repro.core.greedy import greedy_qdtree
    from repro.workloads import asts

    b = errlog_int_bundle
    W = asts(b.queries)
    tree = greedy_qdtree(b.encoded, b.schema, extract_cuts(W), W, b.b)
    baseline = random_partition(len(b.raw), b.b, seed=0)
    workdir = str(tmp_path_factory.mktemp("phys_errlog"))
    res = run_physical(spark, b, tree, baseline, workdir, queries=b.queries[:3])
    assert set(res.totals) == {"qdtree", "qdtree-noroute", "baseline"}
