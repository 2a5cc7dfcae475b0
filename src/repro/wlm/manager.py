"""Workload manager runtime (§5.2): admission, triggers, idle borrowing.

A deterministic discrete-time simulator of LLAP resource management — the
same semantics as Hive's workload manager, testable without wall-clock
races:

* queries route to pools via the active plan's mappings;
* each pool admits at most ``query_parallelism`` concurrent queries; the
  rest wait in the pool's queue;
* triggers are evaluated against per-query runtime metrics each tick; a
  ``MOVE`` re-parents the query (query *fragments* are cheap to preempt,
  which is why Hive can do this mid-flight), a ``KILL`` terminates it;
* queries get guaranteed resource fractions from their pool, but idle
  resources of other pools are lent out and reclaimed when the owning pool
  gets work — the cluster is never deliberately under-utilized.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass, field

from repro.wlm.plans import ResourcePlan

__all__ = ["QueryTask", "WorkloadManager"]


@dataclass
class QueryTask:
    """A running (or queued) query in the simulator.

    ``duration`` is the work left at full-cluster speed; progress per tick
    scales with the resource share actually assigned.
    """

    duration: float
    application: str | None = None
    user: str | None = None
    id: int = field(default_factory=itertools.count(1).__next__)
    pool: str | None = None
    state: str = "pending"  # pending | queued | running | finished | killed
    runtime: float = 0.0  # wall-clock seconds since admission
    progress: float = 0.0  # work completed (full-speed seconds)
    share_history: list[float] = field(default_factory=list)
    moves: list[str] = field(default_factory=list)


class WorkloadManager:
    def __init__(self, plan: ResourcePlan):
        plan.validate()
        self.plan = plan
        self.queues: dict[str, list[QueryTask]] = {p: [] for p in plan.pools}
        self.running: dict[str, list[QueryTask]] = {p: [] for p in plan.pools}
        self.finished: list[QueryTask] = []
        self.killed: list[QueryTask] = []
        self.clock = 0.0

    # -- submission --------------------------------------------------------

    def submit(self, task: QueryTask) -> str:
        pool = self.plan.route(task.application, task.user)
        task.pool = pool
        task.state = "queued"
        self.queues[pool].append(task)
        self._admit()
        return pool

    def _admit(self) -> None:
        for pool_name, queue in self.queues.items():
            cap = self.plan.pools[pool_name].query_parallelism
            while queue and len(self.running[pool_name]) < cap:
                task = queue.pop(0)
                task.state = "running"
                self.running[pool_name].append(task)

    # -- resource accounting ----------------------------------------------

    def shares(self) -> dict[int, float]:
        """Resource share per running query.

        Guaranteed: pool fraction split among its running queries. Idle
        capacity (pools with no running queries, or unused by a plan not
        summing to 1) is lent to the busy queries proportionally — and
        implicitly reclaimed the moment the idle pool admits work.
        """
        shares: dict[int, float] = {}
        idle_capacity = 1.0 - sum(p.alloc_fraction for p in self.plan.pools.values())
        busy: list[QueryTask] = []
        for pool_name, tasks in self.running.items():
            frac = self.plan.pools[pool_name].alloc_fraction
            if not tasks:
                idle_capacity += frac
                continue
            for t in tasks:
                shares[t.id] = frac / len(tasks)
                busy.append(t)
        if busy and idle_capacity > 1e-12:
            bonus = idle_capacity / len(busy)
            for t in busy:
                shares[t.id] += bonus
        return shares

    # -- simulation --------------------------------------------------------

    def tick(self, dt: float = 0.1) -> None:
        self.clock += dt
        shares = self.shares()
        done: list[QueryTask] = []
        for pool_name, tasks in self.running.items():
            for t in tasks:
                share = shares.get(t.id, 0.0)
                t.runtime += dt
                t.progress += dt * share * self._cluster_speed()
                t.share_history.append(share)
                if t.progress >= t.duration:
                    done.append(t)
        for t in done:
            self._finish(t, "finished")
        self._fire_triggers()
        self._admit()

    def _cluster_speed(self) -> float:
        return 1.0

    def _finish(self, task: QueryTask, state: str) -> None:
        self.running[task.pool].remove(task)
        task.state = state
        (self.finished if state == "finished" else self.killed).append(task)

    def _fire_triggers(self) -> None:
        for pool_name in list(self.running):
            for trig in self.plan.triggers_for_pool(pool_name):
                for t in list(self.running[pool_name]):
                    metric = {"total_runtime": t.runtime}.get(trig.metric)
                    if metric is None or metric <= trig.threshold:
                        continue
                    if trig.action == "KILL":
                        self._finish(t, "killed")
                    elif trig.action == "MOVE" and t.pool != trig.target_pool:
                        self.running[pool_name].remove(t)
                        t.moves.append(f"{pool_name}->{trig.target_pool}")
                        t.pool = trig.target_pool
                        cap = self.plan.pools[trig.target_pool].query_parallelism
                        if len(self.running[trig.target_pool]) < cap:
                            self.running[trig.target_pool].append(t)
                        else:
                            t.state = "queued"
                            self.queues[trig.target_pool].append(t)

    def run_until_idle(self, dt: float = 0.1, max_ticks: int = 100_000) -> float:
        """Advance until nothing is queued or running; returns elapsed time."""
        start = self.clock
        for _ in range(max_ticks):
            if not any(self.running.values()) and not any(self.queues.values()):
                break
            self.tick(dt)
        else:
            raise RuntimeError("workload did not drain")
        return self.clock - start
