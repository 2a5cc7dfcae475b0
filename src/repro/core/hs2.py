"""HiveServer2: the end-to-end query driver (Figure 2).

One :class:`HiveServer2` instance owns the metastore-backed ACID layer, the
(optional) LLAP daemon, the query result cache, storage handlers, and the
optimizer, and drives every query through the paper's preparation pipeline:

    feature gate → result-cache probe → MV rewriting → multi-stage
    optimization → dynamic semijoin reduction → shared-work merge →
    physical compilation (Spark/Catalyst) → execution → cache fill,

with query reoptimization (§4.2) wrapped around the plan/run pair when a
retryable execution error surfaces. The ``EngineConfig`` switches let the
same driver impersonate Hive v1.2, v3.1-on-containers, and v3.1+LLAP for
the §7 experiments.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.bloom import BloomFilter
from repro.core.cache import QueryResultCache
from repro.core.compile import compile_plan
from repro.core.context import infer_columns
from repro.core.cost import CostModel
from repro.core.expr import Expr
from repro.core.features import EngineConfig
from repro.core.mv import choose_rewrite, is_fresh, merge_aggregate_states, normalize_spja
from repro.core.optimizer import Optimizer, OptimizerContext, default_stages, v12_stages
from repro.core.plan import Aggregate, ForeignQuery, Plan, Scan
from repro.core.reopt import ExecutionError, ReoptimizingExecutor
from repro.core.semijoin import ReductionReport, apply_reduction
from repro.core.sharedwork import find_shared_subtrees, merge_equivalent_scans
from repro.druid import TIME_COL
from repro.federation.handler import StorageHandler
from repro.llap import LlapCache, LlapDaemon
from repro.metastore import (
    Column,
    HiveMetastore,
    MaterializedView,
    Table,
    collect_stats,
)
from repro.storage import AcidReader, AcidWriter, Compactor
from repro.storage.reader import spark_type

__all__ = ["QuerySpec", "ExecutionReport", "HiveServer2"]


@dataclass(frozen=True)
class QuerySpec:
    """A workload query: plan + required SQL features (+ oracle SQL)."""

    name: str
    plan: Plan
    features: frozenset[str] = frozenset()
    oracle_sql: str | None = None


@dataclass
class ExecutionReport:
    result: pd.DataFrame
    wall_time_s: float = 0.0
    cache_hit: bool = False
    mv_used: str | None = None
    shared_subtrees: int = 0
    semijoin: ReductionReport | None = None
    attempts: int = 1
    final_plan: Plan | None = None


class _HS2ExecutionContext:
    """Execution context: routes scans to LLAP / container / handlers."""

    def __init__(self, server: "HiveServer2"):
        self.server = server
        self._container_started = False
        # per-scan runtime-filter sets (semijoin Blooms), id → {col: bloom}
        self._bloom_registry: dict[int, dict[str, BloomFilter]] = {}
        self._next_bloom_id = 0
        self.wid_floors: dict[str, int] = {}

    def begin_query(self) -> None:
        self._container_started = False
        self._bloom_registry = {}
        self._next_bloom_id = 0

    # called by the semijoin reducer; the returned id goes on the Scan node
    def register_runtime_blooms(self, blooms: dict[str, object]) -> int:
        self._next_bloom_id += 1
        self._bloom_registry[self._next_bloom_id] = dict(blooms)
        return self._next_bloom_id

    def collect_values(self, plan, column: str) -> list | None:
        """Semijoin fast path: evaluate a small Scan/Filter-chain dimension
        subexpression daemon-side (vectorized pandas) instead of launching
        an engine job. Returns None when the shape or mode doesn't fit —
        the reducer then falls back to compiling the subplan."""
        from repro.core.plan import Filter as _Filter

        s = self.server
        if not (s.config.llap and s.daemon is not None):
            return None
        conds = []
        node = plan
        while isinstance(node, _Filter):
            conds.append(node.cond)
            node = node.child
        if not isinstance(node, Scan):
            return None
        table = s.hms.get_table(node.table)
        if table.storage_handler in s.handlers:
            return None
        needed = {column} | {c for cond in conds for c in cond.columns()}
        cols = [c for c in table.column_names() if c in needed]
        try:
            pdf = s.daemon.scan_table(
                node.table,
                partitions=list(node.partitions) if node.partitions is not None else None,
                columns=cols,
            )
            for cond in conds:
                if pdf.empty:
                    break
                pdf = pdf[cond.evaluate_vector(pdf).astype(bool)]
        except Exception:
            return None  # unsupported expression form → engine fallback
        return pdf[column].dropna().unique().tolist()

    def _schema_for(self, table: Table, cols: list[str]) -> T.StructType:
        by_name = {c.name: c.dtype for c in table.columns}
        return T.StructType(
            [T.StructField(c, spark_type(by_name[c])) for c in cols]
        )

    def resolve_scan(self, scan: Scan) -> DataFrame:
        s = self.server
        table = s.hms.get_table(scan.table)
        if table.storage_handler in s.handlers:
            handler = s.handlers[table.storage_handler]
            pdf = handler.input_format(table)
            df = s.spark.createDataFrame(pdf)
            if scan.columns is not None:
                df = df.select(*scan.columns)
            return df

        cols = list(scan.columns) if scan.columns is not None else table.column_names()
        partitions = list(scan.partitions) if scan.partitions is not None else None
        floor = self.wid_floors.get(scan.table, 0)

        if s.config.llap and s.daemon is not None:
            pdf = s.daemon.scan_table(
                scan.table,
                partitions=partitions,
                columns=cols,
                pushed_filters=list(scan.pushed_filters) or None,
                runtime_blooms=self._bloom_registry.get(scan.runtime_filter_id),
                wid_floor=floor,
            )
            if pdf.empty:
                return s.spark.createDataFrame([], self._schema_for(table, cols))
            return s.spark.createDataFrame(pdf, self._schema_for(table, cols))

        # container mode: pay YARN allocation once per query, no caches
        if not self._container_started:
            self._container_started = True
            if s.config.container_startup_s > 0:
                time.sleep(s.config.container_startup_s)
        df = s.reader.scan(
            scan.table, partitions=partitions, columns=cols, wid_floor=floor
        )
        # pushed filters are conservative — applying them is always sound
        for p in scan.pushed_filters:
            df = df.filter(p.to_spark())
        return df

    def resolve_foreign(self, fq: ForeignQuery) -> DataFrame:
        import json

        handler = self.server.handlers[fq.handler]
        pdf = handler.execute_query(fq.table, json.loads(fq.query_repr))
        pdf = pdf[list(fq.schema)]
        if pdf.empty:
            # empty frames carry object dtypes — build the schema explicitly
            table = self.server.hms.get_table(fq.table)
            by_name = {c.name: c.dtype for c in table.columns}
            fields = [
                T.StructField(c, spark_type(by_name.get(c, "double")))
                for c in fq.schema
            ]
            return self.server.spark.createDataFrame([], T.StructType(fields))
        return self.server.spark.createDataFrame(pdf)


class HiveServer2:
    def __init__(
        self,
        spark: SparkSession,
        warehouse: str,
        config: EngineConfig | None = None,
        hms: HiveMetastore | None = None,
    ):
        self.spark = spark
        self.warehouse = str(warehouse)
        self.config = config or EngineConfig.v3_1()
        self.hms = hms or HiveMetastore()
        self.writer = AcidWriter(self.hms, self.warehouse)
        self.reader = AcidReader(self.hms, self.warehouse, spark)
        self.compactor = Compactor(self.hms, self.warehouse)
        self.daemon = (
            LlapDaemon(
                self.hms,
                self.warehouse,
                n_executors=self.config.n_executors,
                cache=LlapCache(self.config.llap_cache_bytes),
            )
            if self.config.llap
            else None
        )
        self.result_cache = QueryResultCache(self.hms)
        self.handlers: dict[str, StorageHandler] = {}
        self.exec_ctx = _HS2ExecutionContext(self)
        # test hook: callable(plan, result_pdf) that may raise ExecutionError
        self.failure_injector = None

    # -- DDL ---------------------------------------------------------------

    def create_table(self, table: Table) -> Table:
        return self.hms.create_table(table)

    def register_handler(self, handler: StorageHandler) -> None:
        self.handlers[handler.name] = handler
        self.hms.register_hook(handler.name, handler)

    # -- DML (each statement is one transaction, §3.2) ---------------------

    def insert(self, table: str, pdf: pd.DataFrame) -> int:
        txn = self.hms.txns.open_txn()
        try:
            wid = self.writer.insert(txn, table, pdf)
            self.hms.txns.commit(txn)
            return wid
        except Exception:
            self.hms.txns.abort(txn)
            raise

    def _victims(self, table: str, cond: Expr) -> pd.DataFrame:
        df = self.reader.scan(table, include_hidden=True)
        return df.filter(cond.to_spark()).toPandas()

    def delete_where(self, table: str, cond: Expr) -> int:
        victims = self._victims(table, cond)
        txn = self.hms.txns.open_txn()
        try:
            wid = self.writer.delete(txn, table, victims)
            self.hms.txns.commit(txn)
            self._mark_views_non_incremental(table)
            return wid
        except Exception:
            self.hms.txns.abort(txn)
            raise

    def update_where(self, table: str, cond: Expr, set_exprs: dict[str, Expr]) -> int:
        victims = self._victims(table, cond)
        new_rows = victims.copy()
        for c, e in set_exprs.items():
            new_rows[c] = e.evaluate_vector(new_rows)
        cols = self.hms.get_table(table).column_names()
        txn = self.hms.txns.open_txn()
        try:
            wid = self.writer.update(txn, table, victims, new_rows[cols])
            self.hms.txns.commit(txn)
            self._mark_views_non_incremental(table)
            return wid
        except Exception:
            self.hms.txns.abort(txn)
            raise

    def merge(
        self,
        table: str,
        source: pd.DataFrame,
        on: str,
        update_cols: list[str] | None = None,
        insert_unmatched: bool = True,
    ) -> int:
        """MERGE INTO table USING source ON table.on = source.on
        WHEN MATCHED THEN UPDATE SET <update_cols from source>
        WHEN NOT MATCHED THEN INSERT — one transaction, one WriteId."""
        target = self.reader.scan(table, include_hidden=True).toPandas()
        cols = self.hms.get_table(table).column_names()
        matched = target.merge(source, on=on, how="inner", suffixes=("", "__src"))
        txn = self.hms.txns.open_txn()
        try:
            wid = None
            if len(matched) and update_cols:
                updated = matched.copy()
                for c in update_cols:
                    src = f"{c}__src" if f"{c}__src" in updated.columns else c
                    updated[c] = updated[src]
                wid = self.writer.update(txn, table, matched, updated[cols])
            if insert_unmatched:
                unmatched = source[~source[on].isin(target[on])]
                if len(unmatched):
                    wid = self.writer.insert(txn, table, unmatched[cols])
            self.hms.txns.commit(txn)
            if update_cols:
                self._mark_views_non_incremental(table)
            return wid if wid is not None else 0
        except Exception:
            self.hms.txns.abort(txn)
            raise

    def _mark_views_non_incremental(self, table: str) -> None:
        for v in self.hms.views():
            if table in v.source_tables:
                v.insert_only_since_rebuild = False

    # -- materialized views (§4.4) ----------------------------------------

    def _table_snapshot(self, tables: list[str]) -> dict[str, int]:
        snap = self.hms.txns.snapshot()
        return {
            t: self.hms.txns.valid_write_ids(snap, t).high_watermark for t in tables
        }

    def create_materialized_view(
        self,
        name: str,
        definition: Plan,
        properties: dict[str, str] | None = None,
        store_in: str = "native",
    ) -> MaterializedView:
        contents = self._run_plan(definition)
        sources = sorted(definition.tables())
        if store_in == "native":
            self.create_table(Table(name, infer_columns(contents), is_acid=True))
            self.insert(name, contents)
        elif store_in == "druid":
            if TIME_COL not in contents.columns:
                raise ValueError("a Druid-backed MV needs a __time column")
            t = Table(
                name,
                infer_columns(contents),
                storage_handler="druid",
                is_acid=False,
                properties={
                    "druid.dimensions": ",".join(
                        c for c in contents.columns
                        if c != TIME_COL and not pd.api.types.is_float_dtype(contents[c])
                    )
                },
            )
            self.create_table(t)
            self.handlers["druid"].output_format(t, contents)
        else:
            raise ValueError(f"unknown MV store {store_in!r}")
        view = MaterializedView(
            name=name,
            definition=definition,
            source_tables=sources,
            snapshot=self._table_snapshot(sources),
            properties=dict(properties or {}),
        )
        view.properties.setdefault("last.rebuild.time", str(time.time()))
        self.hms.register_view(view)
        return view

    def rebuild_materialized_view(self, name: str) -> str:
        """REBUILD: incremental when only INSERTs happened on a single
        source table and the view is SPJA; full rebuild otherwise. Returns
        'incremental' | 'full' | 'noop'."""
        view = self.hms.get_view(name)
        if is_fresh(self.hms, view):
            return "noop"
        current = self._table_snapshot(view.source_tables)
        changed = [t for t in view.source_tables if current[t] != view.snapshot.get(t, 0)]
        mode = "full"
        norm = normalize_spja(view.definition)
        if (
            view.insert_only_since_rebuild
            and len(changed) == 1
            and norm is not None
            and norm.keys is not None
        ):
            mode = "incremental"
            t = changed[0]
            self.exec_ctx.wid_floors = {t: view.snapshot.get(t, 0)}
            try:
                delta = self._run_plan(view.definition)
            finally:
                self.exec_ctx.wid_floors = {}
            old = self._run_plan(Scan(name))
            contents = merge_aggregate_states(
                old, delta, list(norm.keys), list(norm.aggs)
            )
        else:
            contents = self._run_plan(view.definition)
        self._replace_table_contents(name, contents)
        view.snapshot = current
        view.insert_only_since_rebuild = True
        view.properties["last.rebuild.time"] = str(time.time())
        return mode

    def _replace_table_contents(self, name: str, pdf: pd.DataFrame) -> None:
        import shutil
        from pathlib import Path

        table = self.hms.get_table(name)
        path = Path(self.warehouse) / name
        if path.exists():
            shutil.rmtree(path)
        self.hms.reset_stats(name)
        for p in list(self.hms.partitions(name)):
            self.hms.drop_partition(name, p)
        self.insert(name, pdf[table.column_names()])

    # -- query execution ---------------------------------------------------

    def _push_to_handlers(self, plan: Plan) -> Plan:
        """Calcite-style computation pushdown to federated systems (§6.2)."""
        from repro.federation.handler import DruidStorageHandler
        from repro.federation.pushdown import push_to_druid

        for handler in self.handlers.values():
            if isinstance(handler, DruidStorageHandler):
                plan = push_to_druid(plan, self.hms, handler)
        return plan

    def _run_plan(self, plan: Plan) -> pd.DataFrame:
        """Internal execution without caching/rewriting (DDL paths)."""
        ctx = OptimizerContext.for_metastore(self.hms)
        stages = default_stages() if self.config.cbo else v12_stages()
        optimized = Optimizer(ctx, stages).optimize(plan)
        optimized = self._push_to_handlers(optimized)
        self.exec_ctx.begin_query()
        return compile_plan(optimized, self.exec_ctx).toPandas()

    def execute(self, query: QuerySpec | Plan) -> ExecutionReport:
        if isinstance(query, Plan):
            query = QuerySpec(name="adhoc", plan=query)
        self.config.check_features(query.features)
        t0 = time.perf_counter()

        computing = False
        if self.config.result_cache:
            state, payload = self.result_cache.lookup_or_begin(query.plan)
            if state == "hit":
                return ExecutionReport(
                    result=payload, wall_time_s=time.perf_counter() - t0, cache_hit=True
                )
            if state == "wait":
                payload.wait(timeout=60)
                res = self.result_cache.lookup(query.plan)
                if res is not None:
                    return ExecutionReport(
                        result=res, wall_time_s=time.perf_counter() - t0, cache_hit=True
                    )
                state, _ = self.result_cache.lookup_or_begin(query.plan)
            computing = state == "compute" and self.result_cache.is_cacheable(query.plan)

        report = ExecutionReport(result=pd.DataFrame())
        try:
            executor = ReoptimizingExecutor(strategy=self.config.reopt_strategy)
            if self.config.reopt_strategy == "off":
                executor.max_executions = 1

            def plan_fn(overrides: dict, run_config: dict) -> Plan:
                ctx = OptimizerContext.for_metastore(self.hms, overrides)
                plan = query.plan
                if self.config.mv_rewriting:
                    plan, report.mv_used = choose_rewrite(
                        plan, self.hms, ctx.cost, now=time.time()
                    )
                stages = default_stages() if self.config.cbo else v12_stages()
                plan = Optimizer(ctx, stages).optimize(plan)
                plan = self._push_to_handlers(plan)
                self.exec_ctx.begin_query()
                if self.config.semijoin_reduction:
                    plan, report.semijoin = apply_reduction(plan, ctx, self.exec_ctx)
                return plan

            def run_fn(plan: Plan, run_config: dict) -> pd.DataFrame:
                # shared work (§4.5), applied just before execution:
                # merge same-table scans to a common denominator, then
                # compute maximal repeated subtrees once (min_size=1 —
                # merging "starts from scan operations over the same tables")
                if self.config.shared_work:
                    plan = merge_equivalent_scans(plan)
                    shared = find_shared_subtrees(plan, min_size=1)
                else:
                    shared = set()
                report.shared_subtrees = len(shared)
                report.final_plan = plan
                df = compile_plan(plan, self.exec_ctx, shared)
                result = df.toPandas()
                if self.failure_injector is not None:
                    self.failure_injector(plan, result)
                return result

            r = executor.execute(plan_fn, run_fn)
            report.result = r.result
            report.attempts = r.attempts
            if computing:
                self.result_cache.fill(query.plan, r.result)
        except Exception:
            if computing:
                self.result_cache.fail(query.plan)
            raise
        report.wall_time_s = time.perf_counter() - t0
        return report
