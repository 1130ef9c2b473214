"""The four join strategies from the paper's evaluation (§4.1), sharing
one join-phase executor:

- ``no_pred_trans`` — local predicates only, regular joins.
- ``bloom_join``    — one-hop: each join's build side (the incoming,
  locally-filtered table) builds a Bloom filter applied to the probe
  side immediately before that join. No transitive transfer.
- ``yannakakis``    — exact semi-join phase over a BFS join tree
  (forward + backward), then the join phase on the reduced tables.
- ``pred_trans``    — the paper's contribution: Bloom filters
  transferred across the whole join graph (forward + backward passes
  over the small→big DAG), then the join phase.

``run_query`` is the "optimizer rule" of this reproduction: it takes
the logical block (``QuerySpec``) and emits/executes the rewritten
plan, timing the pre-filter phase and the join phase separately
(Figure 3's breakdown).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Dict, List, Optional, Sequence, Tuple

from pyspark.sql import DataFrame, SparkSession

from functools import reduce as _reduce

from pyspark.sql import functions as F

from repro.bloom.spark_bloom import BloomSpec, build_blooms
from repro.core.executor import JoinMeasure, execute_join_phase
from repro.core.semijoin import yannakakis_reduce
from repro.core.spec import QuerySpec
from repro.core.transfer import TransferStats, predicate_transfer

STRATEGIES = ("no_pred_trans", "bloom_join", "yannakakis", "pred_trans")


@dataclass
class RunResult:
    """Outcome of one strategy run: result + phase timings + diagnostics."""

    query: str
    strategy: str
    df: DataFrame
    rows: Optional[list] = None
    pre_s: float = 0.0  # sub-query blocks (executed first, §3.4)
    transfer_s: float = 0.0  # pre-filter phase (blooms / semi-joins)
    join_s: float = 0.0  # join phase incl. finalize + collect
    measures: List[JoinMeasure] = field(default_factory=list)
    scalars: Dict[str, float] = field(default_factory=dict)  # scalar sub-queries
    sizes: Dict[str, int] = field(default_factory=dict)  # filtered inputs
    reduced_sizes: Dict[str, int] = field(default_factory=dict)  # post pre-filter
    transfer_stats: Optional[TransferStats] = None
    _persisted: List[DataFrame] = field(default_factory=list)

    @property
    def total_s(self) -> float:
        return self.pre_s + self.transfer_s + self.join_s

    def cleanup(self) -> None:
        for df in self._persisted:
            df.unpersist()
        self._persisted.clear()


def _resolve_tables(
    spark: SparkSession,
    spec: QuerySpec,
    strategy: str,
    fpp: float,
    res: RunResult,
) -> Dict[str, DataFrame]:
    """Run sub-query blocks (same strategy), then apply local predicates."""
    sub_results: Dict[str, DataFrame] = {}
    scalars: Dict[str, float] = {}
    for sub in spec.subqueries:
        t0 = time.perf_counter()
        rr = run_query(spark, sub.spec, strategy, fpp=fpp, collect=sub.scalar)
        if sub.scalar:
            scalars[sub.name] = rr.rows[0][0]
        else:
            rr.df.persist()
            rr.df.count()
            res._persisted.append(rr.df)
            sub_results[sub.name] = rr.df
        res._persisted.extend(rr._persisted)
        res.pre_s += time.perf_counter() - t0
    res.scalars = scalars
    tables: Dict[str, DataFrame] = {}
    for name, ref in spec.tables.items():
        df = ref.df if ref.df is not None else sub_results[ref.subquery]
        if ref.predicate is not None:
            df = df.filter(ref.predicate)
        tables[name] = df
    return tables


def _count_all(tables: Dict[str, DataFrame]) -> Dict[str, int]:
    """Exact cardinality of every table in a *single* Spark action (a
    union of per-table count aggregates). One job instead of N: at small
    scale factors per-job scheduling overhead, not data volume, is the
    dominant cost of the pre-filter phase."""
    branches = [
        df.agg(F.count(F.lit(1)).alias("n")).select(F.lit(t).alias("t"), "n")
        for t, df in tables.items()
    ]
    return {r["t"]: r["n"] for r in _reduce(DataFrame.unionAll, branches).collect()}


def _bloom_join_step_blooms(spec, tables, sizes, order, fpp):
    """One-hop blooms: for each incoming table, one filter per legal
    connecting edge, built from its locally-filtered rows in one scan."""
    step_blooms: Dict[str, List[Tuple[Tuple[str, ...], object]]] = {}
    placed = {order[0]}
    for t in order[1:]:
        wanted = []  # (build cols on t, probe cols on acc)
        for e in spec.connecting_edges(t, placed):
            if e.can_transfer_from(t):
                wanted.append((e.cols_of(t), e.cols_of(e.other(t))))
        if wanted:
            key_sets = sorted({w[0] for w in wanted})
            specs = [BloomSpec(ks, sizes[t], fpp) for ks in key_sets]
            blooms = dict(zip(key_sets, build_blooms(tables[t], specs)))
            step_blooms[t] = [(probe_cols, blooms[build_cols]) for build_cols, probe_cols in wanted]
        placed.add(t)
    return step_blooms


def run_query(
    spark: SparkSession,
    spec: QuerySpec,
    strategy: str,
    *,
    join_order: Optional[Sequence[str]] = None,
    measure: bool = False,
    fpp: float = 0.01,
    yann_root: Optional[str] = None,
    collect: bool = True,
) -> RunResult:
    """Execute ``spec`` under ``strategy``. The caller should invoke
    ``result.cleanup()`` once done with ``result.df``."""
    if strategy not in STRATEGIES:
        raise ValueError(f"unknown strategy {strategy!r}; expected one of {STRATEGIES}")
    res = RunResult(query=spec.name, strategy=strategy, df=None)  # type: ignore[arg-type]
    tables = _resolve_tables(spark, spec, strategy, fpp, res)
    order = list(join_order or spec.join_order)

    t0 = time.perf_counter()
    step_blooms = None
    if strategy in ("bloom_join", "pred_trans"):
        # Exact filtered-input cardinalities: bloom sizing + (for
        # pred_trans) the small→big orientation heuristic. Counted here
        # because it is planning work of the pre-filter phase.
        res.sizes = _count_all(tables)
    if strategy == "pred_trans":
        reduced, res.transfer_stats = predicate_transfer(
            tables, spec.edges, res.sizes, fpp=fpp
        )
    elif strategy == "yannakakis":
        reduced, _tree = yannakakis_reduce(tables, spec.edges, yann_root or order[0])
    elif strategy == "bloom_join":
        step_blooms = _bloom_join_step_blooms(spec, tables, res.sizes, order, fpp)
        reduced = tables
    else:
        reduced = tables
    if strategy in ("pred_trans", "yannakakis"):
        # Materialize the reduced tables — the unified-plan handoff of
        # §3.3: the join phase starts from these, never rescanning.
        # One counting action materializes every persisted table.
        for t, df in reduced.items():
            df.persist()
            res._persisted.append(df)
        res.reduced_sizes = _count_all(reduced)
    res.transfer_s = time.perf_counter() - t0

    t1 = time.perf_counter()
    joined, res.measures = execute_join_phase(
        spec, reduced, join_order=order, step_blooms=step_blooms, measure=measure
    )
    res.df = spec.finalize(joined, res.scalars)
    if collect:
        res.rows = res.df.collect()
    res.join_s = time.perf_counter() - t1
    return res
