"""Workload-manager resource plans (§5.2).

A resource plan is a self-contained resource-sharing configuration:

* *pools* with a fraction of the cluster's LLAP resources and a maximum
  query parallelism;
* *mappings* routing incoming queries to pools by application, user, or
  group;
* *triggers* firing actions (``MOVE`` to another pool, ``KILL``) when a
  runtime metric crosses a threshold.

Plans are persisted in HMS (``HiveMetastore.save_resource_plan``) and only
one plan is active per deployment at a time. The builder API below mirrors
the paper's DDL example one statement per method::

    plan = ResourcePlan("daytime")
    plan.create_pool("bi", alloc_fraction=0.8, query_parallelism=5)
    plan.create_pool("etl", alloc_fraction=0.2, query_parallelism=20)
    plan.create_trigger("downgrade", "total_runtime", 3.0, "MOVE", "etl")
    plan.add_trigger_to_pool("downgrade", "bi")
    plan.create_application_mapping("interactive_bi", "bi")
    plan.set_default_pool("etl")
    plan.validate()
"""
from __future__ import annotations

from dataclasses import dataclass, field

__all__ = ["Pool", "Mapping", "Trigger", "ResourcePlan"]


@dataclass
class Pool:
    name: str
    alloc_fraction: float
    query_parallelism: int


@dataclass
class Mapping:
    kind: str  # 'application' | 'user' | 'group'
    value: str
    pool: str


@dataclass
class Trigger:
    name: str
    metric: str  # e.g. 'total_runtime' (seconds), 'rows_produced'
    threshold: float
    action: str  # 'MOVE' | 'KILL'
    target_pool: str | None = None  # for MOVE
    pools: list[str] = field(default_factory=list)  # pools the rule is added to


@dataclass
class ResourcePlan:
    name: str
    pools: dict[str, Pool] = field(default_factory=dict)
    mappings: list[Mapping] = field(default_factory=list)
    triggers: dict[str, Trigger] = field(default_factory=dict)
    default_pool: str | None = None
    enabled: bool = False

    # -- builder (one method per DDL statement) ---------------------------

    def create_pool(self, name: str, alloc_fraction: float, query_parallelism: int) -> "ResourcePlan":
        if name in self.pools:
            raise ValueError(f"pool {name!r} already exists")
        self.pools[name] = Pool(name, alloc_fraction, query_parallelism)
        return self

    def create_trigger(
        self, name: str, metric: str, threshold: float, action: str, target_pool: str | None = None
    ) -> "ResourcePlan":
        if action not in ("MOVE", "KILL"):
            raise ValueError(f"unknown trigger action {action!r}")
        if action == "MOVE" and target_pool is None:
            raise ValueError("MOVE trigger requires a target pool")
        self.triggers[name] = Trigger(name, metric, threshold, action, target_pool)
        return self

    def add_trigger_to_pool(self, trigger: str, pool: str) -> "ResourcePlan":
        self.triggers[trigger].pools.append(pool)
        return self

    def create_application_mapping(self, application: str, pool: str) -> "ResourcePlan":
        self.mappings.append(Mapping("application", application, pool))
        return self

    def create_user_mapping(self, user: str, pool: str) -> "ResourcePlan":
        self.mappings.append(Mapping("user", user, pool))
        return self

    def set_default_pool(self, pool: str) -> "ResourcePlan":
        self.default_pool = pool
        return self

    # -- validation / routing ---------------------------------------------

    def validate(self) -> "ResourcePlan":
        total = sum(p.alloc_fraction for p in self.pools.values())
        if total > 1.0 + 1e-9:
            raise ValueError(f"pool fractions sum to {total} > 1")
        for t in self.triggers.values():
            if t.action == "MOVE" and t.target_pool not in self.pools:
                raise ValueError(f"trigger {t.name!r} targets unknown pool {t.target_pool!r}")
            for p in t.pools:
                if p not in self.pools:
                    raise ValueError(f"trigger {t.name!r} added to unknown pool {p!r}")
        if self.default_pool is not None and self.default_pool not in self.pools:
            raise ValueError(f"default pool {self.default_pool!r} unknown")
        for m in self.mappings:
            if m.pool not in self.pools:
                raise ValueError(f"mapping routes to unknown pool {m.pool!r}")
        return self

    def route(self, application: str | None = None, user: str | None = None) -> str:
        """Pool for an incoming query: mappings first, then the default."""
        for m in self.mappings:
            if m.kind == "application" and application == m.value:
                return m.pool
            if m.kind == "user" and user == m.value:
                return m.pool
        if self.default_pool is None:
            raise ValueError("no mapping matched and no default pool set")
        return self.default_pool

    def triggers_for_pool(self, pool: str) -> list[Trigger]:
        return [t for t in self.triggers.values() if pool in t.pools]
