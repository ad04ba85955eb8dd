"""End-to-end R2D2 pipeline: SGB -> MMP -> CLP (§4, Fig 1).

Runs the three stages as sequential Spark-backed jobs over a lake
catalog and records, per stage:

- the surviving graph (for Tables 1 and 2's edge accounting),
- wall-clock time (Table 5),
- the pairwise row-level operation counters of Table 3
  (SGB comparisons, MMP edge examinations, CLP ``Σ M_i · t``).
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from .clp import CLPResult, content_level_prune
from .graph import ContainmentGraph, EdgeAccounting, account_edges
from .mmp import MMPResult, StatsProvider, min_max_prune
from .sgb import SGBResult, build_schema_graph


@dataclass
class OpCounts:
    """Table 3 operation counters for one pipeline run.

    ``gt_schema`` and ``gt_content`` are the brute-force costs the paper
    lists alongside: C(N,2) schema comparisons and ``Σ M_i·M_j`` over
    schema-graph edges.
    """

    sgb: int
    mmp: int
    clp: int
    gt_schema: int
    gt_content: int


@dataclass
class PipelineResult:
    sgb: SGBResult
    mmp: MMPResult
    clp: CLPResult
    #: seconds per stage, keyed "SGB" / "MMP" / "CLP".
    timings: dict[str, float]
    ops: OpCounts

    @property
    def final_graph(self) -> ContainmentGraph:
        return self.clp.graph

    def stage_graphs(self) -> dict[str, ContainmentGraph]:
        return {
            "SGB": self.sgb.graph,
            "MMP": self.mmp.graph,
            "CLP": self.clp.graph,
        }

    def accounting(
        self, gt_edges: set[tuple[str, str]]
    ) -> dict[str, EdgeAccounting]:
        """Tables 1-2 rows: edge classification after each stage."""
        return {
            stage: account_edges(g, gt_edges)
            for stage, g in self.stage_graphs().items()
        }


def run_pipeline(
    catalog,
    *,
    s: int = 4,
    t: int = 10,
    include_strings: bool = False,
    seed: int = 0,
) -> PipelineResult:
    """Run the full R2D2 pipeline over ``catalog``.

    ``s``/``t`` are the CLP column/row sampling budgets (paper default
    s=4, t=10 — §6.6). Statistics for MMP come from Parquet footers when
    tables are Parquet-backed.
    """
    t0 = time.perf_counter()
    sgb = build_schema_graph(catalog.schemas())
    t1 = time.perf_counter()

    provider = StatsProvider(catalog)
    mmp = min_max_prune(sgb.graph, provider, include_strings=include_strings)
    t2 = time.perf_counter()

    clp = content_level_prune(
        mmp.graph, catalog, s=s, t=t, provider=provider, seed=seed
    )
    t3 = time.perf_counter()

    n = len(catalog.names())
    rows = {name: catalog.meta(name).num_rows for name in catalog.names()}
    gt_content_ops = sum(
        rows[p] * rows[c] for p, c in sgb.graph.edge_list()
    )
    ops = OpCounts(
        sgb=sgb.comparisons,
        mmp=mmp.edges_examined,
        clp=clp.row_operations,
        gt_schema=n * (n - 1) // 2,
        gt_content=gt_content_ops,
    )
    return PipelineResult(
        sgb=sgb,
        mmp=mmp,
        clp=clp,
        timings={"SGB": t1 - t0, "MMP": t2 - t1, "CLP": t3 - t2},
        ops=ops,
    )
