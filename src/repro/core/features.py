"""SQL feature gating and engine-version presets (§7.1).

Figure 7's baseline is Hive v1.2, which could run only 50 of the 99 TPC-DS
queries because it lacked: set operations (EXCEPT/INTERSECT), correlated
scalar subqueries with non-equi join conditions, interval notation, and
ORDER BY unselected columns — and it predates the CBO-era optimizations,
ACID v2, LLAP, result caching and materialized views.

Queries in the workloads are tagged with the SQL features they require;
an :class:`EngineConfig` carries the unsupported set plus one switch per
optimization described in the paper, so "Hive v1.2" and "Hive v3.1" are
two configurations of the same codebase — exactly how the reproduction
isolates the contribution of each feature.
"""
from __future__ import annotations

from dataclasses import dataclass, field, replace

__all__ = [
    "SQLFeature",
    "UnsupportedSQLError",
    "EngineConfig",
]


class SQLFeature:
    """Feature tags used by workload queries (a subset of §7.1's list)."""

    INTERSECT = "intersect"
    EXCEPT = "except"
    CORRELATED_SCALAR_SUBQUERY = "correlated_scalar_subquery_non_equi"
    INTERVAL_NOTATION = "interval_notation"
    ORDER_BY_UNSELECTED = "order_by_unselected"
    GROUPING_SETS = "grouping_sets"

    V12_MISSING = frozenset(
        {
            INTERSECT,
            EXCEPT,
            CORRELATED_SCALAR_SUBQUERY,
            INTERVAL_NOTATION,
            ORDER_BY_UNSELECTED,
            GROUPING_SETS,
        }
    )


class UnsupportedSQLError(RuntimeError):
    """Raised when a query needs SQL features the engine version lacks."""


@dataclass(frozen=True)
class EngineConfig:
    name: str
    unsupported_features: frozenset[str] = frozenset()
    # optimizer
    cbo: bool = True  # Calcite cost-based pipeline vs v1.2 rule-based
    mv_rewriting: bool = True
    result_cache: bool = True
    shared_work: bool = True
    semijoin_reduction: bool = True
    reopt_strategy: str = "reoptimize"  # 'overlay' | 'reoptimize' | 'off'
    # runtime
    llap: bool = True
    container_startup_s: float = 0.25  # YARN allocation cost paid per query
    n_executors: int = 4
    llap_cache_bytes: int = 512 * 1024 * 1024

    @classmethod
    def v3_1(cls, **overrides) -> "EngineConfig":
        """Hive v3.1 with LLAP: everything in the paper enabled."""
        return replace(cls(name="v3.1"), **overrides)

    @classmethod
    def v3_1_container(cls, **overrides) -> "EngineConfig":
        """Hive v3.1 on plain containers — the Table 1 comparison arm."""
        return replace(cls(name="v3.1-container", llap=False), **overrides)

    @classmethod
    def v1_2(cls, **overrides) -> "EngineConfig":
        """Hive v1.2 on Tez 0.5: gated SQL, rule-based optimizer only, no
        LLAP/caches/MV/semijoin/shared-work, and the first-generation
        reader overhead (modelled by the per-query container start-up)."""
        base = cls(
            name="v1.2",
            unsupported_features=SQLFeature.V12_MISSING,
            cbo=False,
            mv_rewriting=False,
            result_cache=False,
            shared_work=False,
            semijoin_reduction=False,
            reopt_strategy="off",
            llap=False,
            container_startup_s=0.25,
        )
        return replace(base, **overrides)

    def check_features(self, required: frozenset[str]) -> None:
        missing = required & self.unsupported_features
        if missing:
            raise UnsupportedSQLError(
                f"engine {self.name!r} does not support: {sorted(missing)}"
            )
