"""Tests for the FeatureScript spec and the unified plan generator
(window merging, compilation cache — Section 4.2)."""
import pytest

from repro.core.plan import CACHE_STATS, clear_cache, compile_script
from repro.core.spec import (
    AggSpec,
    Condition,
    FeatureScript,
    LastJoinSpec,
    WindowSpec,
)


def _script(n_windows=2, same_template=False):
    windows = []
    for i in range(n_windows):
        windows.append(
            WindowSpec(
                name=f"w{i}",
                partition_by="userid",
                order_by="ts",
                range_ms=5_000 if same_template else 5_000 * (i + 1),
            )
        )
    aggs = tuple(AggSpec("sum", "price", f"w{i}", f"s{i}") for i in range(n_windows))
    return FeatureScript(
        base_table="events", key_col="userid", ts_col="ts", windows=tuple(windows), aggs=aggs
    )


class TestSpecValidation:
    def test_window_needs_exactly_one_frame(self):
        with pytest.raises(ValueError):
            WindowSpec(name="w", partition_by="k", order_by="ts")
        with pytest.raises(ValueError):
            WindowSpec(name="w", partition_by="k", order_by="ts", range_ms=1, rows=1)

    def test_nonpositive_frames_rejected(self):
        with pytest.raises(ValueError):
            WindowSpec(name="w", partition_by="k", order_by="ts", range_ms=0)
        with pytest.raises(ValueError):
            WindowSpec(name="w", partition_by="k", order_by="ts", rows=0)

    def test_condition_op_validated(self):
        with pytest.raises(ValueError):
            Condition("a", "~", 1)
        assert Condition("a", "==", 1).sql() == "a = 1"

    def test_duplicate_window_names_rejected(self):
        w = WindowSpec(name="w", partition_by="k", order_by="ts", range_ms=1)
        with pytest.raises(ValueError):
            FeatureScript("t", "k", "ts", (w, w), ())

    def test_agg_references_unknown_window(self):
        w = WindowSpec(name="w", partition_by="k", order_by="ts", range_ms=1)
        with pytest.raises(ValueError):
            FeatureScript("t", "k", "ts", (w,), (AggSpec("sum", "v", "nope", "o"),))

    def test_duplicate_outputs_rejected(self):
        w = WindowSpec(name="w", partition_by="k", order_by="ts", range_ms=1)
        with pytest.raises(ValueError):
            FeatureScript(
                "t", "k", "ts", (w,),
                (AggSpec("sum", "v", "w", "o"), AggSpec("count", "v", "w", "o")),
            )

    def test_feature_names_order(self):
        w = WindowSpec(name="w", partition_by="k", order_by="ts", range_ms=1)
        s = FeatureScript(
            "t", "k", "ts", (w,),
            (AggSpec("sum", "v", "w", "a"), AggSpec("count", "v", "w", "b")),
            (LastJoinSpec("ref", "k", "ts", ("x", "y")),),
        )
        assert s.feature_names == ["a", "b", "ref_x", "ref_y"]


class TestWindowMerging:
    def test_identical_templates_merge(self):
        clear_cache()
        plan = compile_script(_script(n_windows=3, same_template=True))
        assert plan.n_physical_windows == 1
        # All aggregates route to the single merged window.
        canon = plan.physical_windows[0].name
        assert len(plan.agg_groups[canon]) == 3

    def test_distinct_templates_kept(self):
        clear_cache()
        plan = compile_script(_script(n_windows=3, same_template=False))
        assert plan.n_physical_windows == 3

    def test_alias_resolution(self):
        clear_cache()
        plan = compile_script(_script(n_windows=2, same_template=True))
        assert plan.window_alias["w0"] == plan.window_alias["w1"] == "w0"
        assert len(plan.aggs_for("w1")) == 2

    def test_union_tables_part_of_template(self):
        clear_cache()
        w0 = WindowSpec(name="w0", partition_by="k", order_by="ts", range_ms=1)
        w1 = WindowSpec(name="w1", partition_by="k", order_by="ts", range_ms=1, union_tables=("u",))
        s = FeatureScript(
            "t", "k", "ts", (w0, w1),
            (AggSpec("sum", "v", "w0", "a"), AggSpec("sum", "v", "w1", "b")),
        )
        assert compile_script(s).n_physical_windows == 2


class TestCompilationCache:
    def test_same_script_hits_cache(self):
        clear_cache()
        s1 = _script()
        s2 = _script()  # structurally identical, distinct object
        assert s1 is not s2
        p1 = compile_script(s1)
        p2 = compile_script(s2)
        assert p1 is p2
        assert CACHE_STATS.compiles == 1
        assert CACHE_STATS.hits == 1

    def test_different_script_compiles_again(self):
        clear_cache()
        compile_script(_script(n_windows=1))
        compile_script(_script(n_windows=2))
        assert CACHE_STATS.compiles == 2
        assert CACHE_STATS.hits == 0

    def test_clear_cache_resets(self):
        clear_cache()
        compile_script(_script())
        clear_cache()
        compile_script(_script())
        assert CACHE_STATS.compiles == 1
