"""Query reoptimization (§4.2): overlay and reoptimize strategies."""
import pytest

from repro.core.reopt import ExecutionError, ReoptimizingExecutor


def make_env(fail_on_broadcast=True, actual_rows=5000.0):
    """A tiny planner/runner pair modelling the paper's scenario: HMS
    statistics underestimate a join input, the planner picks a broadcast
    (map-side) join, and execution blows the memory budget."""
    log = {"plans": [], "runs": []}

    def plan_fn(overrides, config):
        estimated = overrides.get("build_side", 100.0)  # HMS says small
        if config.get("join_strategy") == "shuffle":
            algo = "shuffle"
        else:
            algo = "broadcast" if estimated < 1000 else "shuffle"
        log["plans"].append(algo)
        return algo

    def run_fn(plan, config):
        log["runs"].append(plan)
        if plan == "broadcast" and fail_on_broadcast:
            raise ExecutionError(
                "simulated OOM in broadcast join",
                runtime_stats={"build_side": actual_rows},
            )
        return f"ok:{plan}"

    return plan_fn, run_fn, log


class TestNoFailure:
    def test_single_attempt(self):
        plan_fn, run_fn, log = make_env(fail_on_broadcast=False)
        r = ReoptimizingExecutor().execute(plan_fn, run_fn)
        assert r.result == "ok:broadcast"
        assert r.attempts == 1
        assert r.strategy_used is None


class TestOverlay:
    def test_overlay_forces_config(self):
        """All re-executions run with the configured overlay (robust join)."""
        plan_fn, run_fn, log = make_env()
        ex = ReoptimizingExecutor(strategy="overlay")
        r = ex.execute(plan_fn, run_fn)
        assert r.result == "ok:shuffle"
        assert r.attempts == 2
        assert r.strategy_used == "overlay"
        assert log["plans"] == ["broadcast", "shuffle"]

    def test_custom_overlay(self):
        plan_fn, run_fn, _ = make_env()
        ex = ReoptimizingExecutor(
            strategy="overlay", overlay_config={"join_strategy": "shuffle"}
        )
        assert ex.execute(plan_fn, run_fn).result == "ok:shuffle"


class TestReoptimize:
    def test_runtime_stats_change_plan(self):
        """The replanned query sees the observed cardinality and picks the
        robust algorithm on its own."""
        plan_fn, run_fn, log = make_env()
        ex = ReoptimizingExecutor(strategy="reoptimize")
        r = ex.execute(plan_fn, run_fn)
        assert r.result == "ok:shuffle"
        assert r.strategy_used == "reoptimize"
        assert r.runtime_stats == {"build_side": 5000.0}
        assert log["plans"] == ["broadcast", "shuffle"]

    def test_stats_accumulate_across_attempts(self):
        calls = []

        def plan_fn(overrides, config):
            calls.append(dict(overrides))
            return "p"

        def run_fn(plan, config):
            if len(calls) < 3:
                raise ExecutionError("again", runtime_stats={f"op{len(calls)}": 1.0})
            return "done"

        ex = ReoptimizingExecutor(strategy="reoptimize", max_executions=3)
        r = ex.execute(plan_fn, run_fn)
        assert r.result == "done"
        assert calls[2] == {"op1": 1.0, "op2": 1.0}


class TestFailurePaths:
    def test_off_strategy_raises_immediately(self):
        plan_fn, run_fn, log = make_env()
        with pytest.raises(ExecutionError):
            ReoptimizingExecutor(strategy="off").execute(plan_fn, run_fn)
        assert log["runs"] == ["broadcast"]

    def test_exhausted_attempts_raise(self):
        def plan_fn(overrides, config):
            return "p"

        def run_fn(plan, config):
            raise ExecutionError("always fails")

        with pytest.raises(ExecutionError):
            ReoptimizingExecutor(max_executions=2).execute(plan_fn, run_fn)

    def test_unknown_strategy(self):
        plan_fn, run_fn, _ = make_env()
        with pytest.raises(ValueError):
            ReoptimizingExecutor(strategy="bogus").execute(plan_fn, run_fn)
