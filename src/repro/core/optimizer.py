"""Multi-stage optimizer driver (§4.1).

Hive guides the plan search by running several optimization *stages*, each a
(planner, rule set) pair, instead of throwing every rule into one bucket —
"multi-stage optimization similar to other query optimizers [Orca]". Two
planner engines are modelled, matching Calcite's:

* ``exhaustive`` — applies the stage's rules to a fixpoint (bounded);
* ``cost`` — applies each rule once, keeping the result only if the cost
  model says it is no worse (used for join reordering).

The default pipeline:

1. *rewrite* (exhaustive): constant folding, predicate simplification,
   filter merge/pushdown, trivial-operator elimination;
2. *cbo* (cost): join reordering;
3. *physical* (exhaustive, one pass): static partition pruning, projection
   pruning, sargable-predicate annotation for the LLAP elevator.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable

from repro.core.cost import CostModel
from repro.core.joinreorder import reorder_joins
from repro.core.plan import Plan
from repro.core.rules import (
    annotate_sargable_filters,
    eliminate_trivial_ops,
    fold_constants,
    merge_filters,
    prune_columns,
    prune_partitions,
    push_filter_into_aggregate,
    push_filter_through_join,
    push_filter_through_union,
    simplify_predicates,
)
from repro.metastore import HiveMetastore

__all__ = ["OptimizerContext", "Stage", "Optimizer", "default_stages", "v12_stages"]

Rule = Callable[[Plan, "OptimizerContext"], Plan]


@dataclass
class OptimizerContext:
    hms: HiveMetastore
    cost: CostModel

    @classmethod
    def for_metastore(
        cls, hms: HiveMetastore, overrides: dict[str, float] | None = None
    ) -> "OptimizerContext":
        return cls(hms, CostModel(hms, overrides or {}))


@dataclass
class Stage:
    name: str
    rules: list[Rule]
    planner: str = "exhaustive"  # 'exhaustive' | 'cost'
    max_iterations: int = 10

    def run(self, plan: Plan, ctx: OptimizerContext) -> Plan:
        if self.planner == "cost":
            for rule in self.rules:
                candidate = rule(plan, ctx)
                if candidate is not plan and candidate != plan:
                    if ctx.cost.plan_cost(candidate) <= ctx.cost.plan_cost(plan):
                        plan = candidate
            return plan
        # exhaustive: fixpoint over the rule set
        for _ in range(self.max_iterations):
            before = plan
            for rule in self.rules:
                plan = rule(plan, ctx)
            if plan == before:
                break
        return plan


def default_stages() -> list[Stage]:
    """The full Hive v3.1-style pipeline."""
    return [
        Stage(
            "rewrite",
            [
                fold_constants,
                simplify_predicates,
                merge_filters,
                push_filter_through_join,
                push_filter_through_union,
                push_filter_into_aggregate,
                eliminate_trivial_ops,
            ],
        ),
        Stage("cbo", [reorder_joins], planner="cost"),
        Stage(
            "physical",
            [prune_partitions, prune_columns, annotate_sargable_filters],
            max_iterations=1,
        ),
    ]


def v12_stages() -> list[Stage]:
    """Hive v1.2-style rule-based-only pipeline (§7.1 baseline): simple
    physical-plan rewrites — filter pushdown, column pruning, static
    partition pruning — but no Calcite CBO (no join reordering, no
    cost-based anything)."""
    return [
        Stage(
            "rule-based",
            [merge_filters, push_filter_through_join, eliminate_trivial_ops],
        ),
        Stage("physical", [prune_partitions, prune_columns], max_iterations=1),
    ]


@dataclass
class Optimizer:
    ctx: OptimizerContext
    stages: list[Stage] = field(default_factory=default_stages)

    def optimize(self, plan: Plan) -> Plan:
        for stage in self.stages:
            plan = stage.run(plan, self.ctx)
        return plan
