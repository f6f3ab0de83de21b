"""Physical execution on Spark: runtime of qd-tree vs baseline layouts.

Reproduces the paper's Sec 7.4.1 / 7.5.1 experiments (Figures 5 and 7) at
local scale: write each layout as ``partitionBy("bid")`` Parquet, then run
the workload three ways —

* ``qdtree`` — qd-tree layout + explicit ``BID IN (...)`` query routing,
* ``qdtree-noroute`` — qd-tree layout, engine-native pruning only,
* ``baseline`` — the comparison layout (random / range / Bottom-Up).

Each query runs as a count+sum aggregate (forces actual column reads).
Reported per template: mean wall-clock and tuples resident in the scanned
blocks (the logical I/O the paper's speedups track).
"""
from __future__ import annotations

import time
from collections import defaultdict
from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from ..core.qdtree import QdTree
from ..spark_io.layout import (
    read_routed,
    spark_df_from_raw,
    write_bid_layout,
    write_tree_layout,
)
from .table2 import WorkloadBundle


@dataclass
class PhysicalResult:
    per_template: dict  # template -> mode -> [seconds]
    rows_routed: dict  # template -> tuples in scanned blocks (qd-tree route)
    totals: dict = field(default_factory=dict)  # mode -> total seconds

    def summarize(self) -> dict:
        self.totals = {
            mode: float(sum(np.mean(v[mode]) for v in self.per_template.values()))
            for mode in next(iter(self.per_template.values()))
        }
        return self.totals


def _numeric_probe(bundle: WorkloadBundle) -> str:
    """A truly-numeric column to aggregate, forcing real column I/O.

    ``schema.numeric_cols`` also lists DATE columns (they are numeric in
    encoded space) but Spark cannot ``sum`` a DateType — skip those."""
    from ..core.schema import NUMERIC

    for name in bundle.schema.numeric_cols:
        if bundle.schema[name].kind == NUMERIC:
            return name
    raise ValueError("workload has no numeric column")


def run_physical(
    spark: SparkSession,
    bundle: WorkloadBundle,
    tree: QdTree,
    baseline_bids: np.ndarray,
    workdir: str,
    queries=None,
    modes: tuple = ("qdtree", "qdtree-noroute", "baseline"),
) -> PhysicalResult:
    """Write the two layouts under ``workdir`` and time the workload."""
    queries = queries if queries is not None else bundle.queries
    probe = _numeric_probe(bundle)
    tree_path = f"{workdir}/qdtree"
    base_path = f"{workdir}/baseline"

    raw_df = spark_df_from_raw(spark, bundle.raw, bundle.schema)
    write_tree_layout(raw_df, tree, tree_path)
    write_bid_layout(spark, bundle.raw, baseline_bids, bundle.schema, base_path)

    block_sizes = np.bincount(tree.route(bundle.encoded), minlength=tree.n_leaves)
    per_template: dict = defaultdict(lambda: defaultdict(list))
    rows_routed: dict = defaultdict(int)

    for q in queries:
        for mode in modes:
            t0 = time.perf_counter()
            if mode == "qdtree":
                df = read_routed(spark, tree_path, q.ast, bundle.schema, tree=tree)
            elif mode == "qdtree-noroute":
                df = read_routed(spark, tree_path, q.ast, bundle.schema, tree=None)
            else:
                df = read_routed(spark, base_path, q.ast, bundle.schema, tree=None)
            df.agg(
                F.count(F.lit(1)).alias("cnt"), F.sum(probe).alias("s")
            ).collect()
            per_template[q.template][mode].append(time.perf_counter() - t0)
        rows_routed[q.template] += int(block_sizes[tree.query_bids(q.ast)].sum())

    res = PhysicalResult(
        {t: dict(m) for t, m in per_template.items()}, dict(rows_routed)
    )
    res.summarize()
    return res


def format_physical(res: PhysicalResult) -> str:
    """Markdown: per-template mean runtimes and the workload totals."""
    modes = list(next(iter(res.per_template.values())))
    lines = [
        "| Template | " + " | ".join(modes) + " | rows routed |",
        "|" + "---|" * (len(modes) + 2),
    ]
    for t, m in sorted(res.per_template.items()):
        cells = " | ".join(f"{1000 * float(np.mean(m[mode])):.0f}ms" for mode in modes)
        lines.append(f"| {t} | {cells} | {res.rows_routed.get(t, 0)} |")
    tot = " | ".join(f"{res.totals[mode]:.2f}s" for mode in modes)
    lines.append(f"| **total** | {tot} | |")
    return "\n".join(lines)
