"""Unit tests for the shared aggregation kernels (cycle binding,
decomposable partial states, subtract-and-evict)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.kernels import (
    DECOMPOSABLE,
    INVERTIBLE,
    add_value,
    eval_aggs,
    finalize_state,
    merge_states,
    partial_state,
    subtract_value,
)
from repro.core.spec import AggSpec, Condition

VALS = np.array([10.0, 20.0, 5.0, 15.0, 30.0, 12.0])
CATS = np.array(["a", "b", "a", "b", "a", "c"])
QTY = np.array([1, 2, 3, 1, 2, 5])
COLS = {"v": VALS, "cat": CATS, "qty": QTY}


def _agg(func, col="v", out="o", params=(), where=None):
    return AggSpec(func, col, "w", out, params=params, where=where)


class TestEvalAggs:
    @pytest.mark.parametrize(
        "func,expected",
        [
            ("sum", 92.0),
            ("count", 6),
            ("min", 5.0),
            ("max", 30.0),
            ("avg", 92.0 / 6),
        ],
    )
    def test_standard_aggs(self, func, expected):
        assert eval_aggs(COLS, [_agg(func)])["o"] == pytest.approx(expected)

    def test_distinct_count(self):
        assert eval_aggs(COLS, [_agg("distinct_count", col="cat")])["o"] == 3

    def test_topn_frequency_order_and_ties(self):
        # a:3, b:2, c:1 — frequency desc, key asc on ties.
        assert eval_aggs(COLS, [_agg("topn_frequency", col="cat", params=(2,))])["o"] == "a,b"
        assert eval_aggs(COLS, [_agg("topn_frequency", col="cat", params=(5,))])["o"] == "a,b,c"

    def test_drawdown(self):
        # Peak 20 then trough 5 → (20-5)/20 = 0.75.
        assert eval_aggs(COLS, [_agg("drawdown")])["o"] == pytest.approx(0.75)

    def test_drawdown_monotone_rise_is_zero(self):
        cols = {"v": np.array([1.0, 2.0, 3.0])}
        assert eval_aggs(cols, [_agg("drawdown")])["o"] == 0.0

    def test_ew_avg_weights_recent_more(self):
        cols = {"v": np.array([0.0, 0.0, 10.0])}
        out = eval_aggs(cols, [_agg("ew_avg", params=(0.5,))])["o"]
        plain = 10.0 / 3
        assert out > plain  # newest value dominates

    def test_ew_avg_closed_form(self):
        alpha = 0.5
        v = np.array([1.0, 2.0, 4.0])
        w = np.array([0.25, 0.5, 1.0])
        assert eval_aggs({"v": v}, [_agg("ew_avg", params=(alpha,))])["o"] == pytest.approx(
            float((w * v).sum() / w.sum())
        )

    def test_conditional_aggregation(self):
        a = _agg("sum", where=Condition("qty", ">", 1))
        assert eval_aggs(COLS, [a])["o"] == pytest.approx(20 + 5 + 30 + 12)

    @pytest.mark.parametrize("op,expected", [(">", 4), (">=", 6), ("<", 0), ("<=", 2), ("==", 2), ("!=", 4)])
    def test_all_condition_ops(self, op, expected):
        a = _agg("count", where=Condition("qty", op, 1))
        assert eval_aggs(COLS, [a])["o"] == expected

    def test_avg_cate(self):
        a = _agg("avg_cate", params=("cat",))
        assert eval_aggs(COLS, [a])["o"] == "a:15.000000,b:17.500000,c:12.000000"

    def test_avg_cate_where(self):
        a = _agg("avg_cate", params=("cat",), where=Condition("qty", ">", 1))
        assert eval_aggs(COLS, [a])["o"] == "a:17.500000,b:20.000000,c:12.000000"

    def test_empty_window(self):
        empty = {"v": np.array([]), "cat": np.array([]), "qty": np.array([])}
        out = eval_aggs(
            empty,
            [
                _agg("sum", out="s"),
                _agg("count", out="c"),
                _agg("min", out="mn"),
                _agg("avg", out="a"),
                _agg("drawdown", out="d"),
                _agg("ew_avg", out="e", params=(0.5,)),
                _agg("avg_cate", out="ac", params=("cat",)),
            ],
        )
        assert out == {"s": 0.0, "c": 0, "mn": None, "a": None, "d": None, "e": None, "ac": ""}

    def test_unknown_aggregate_rejected(self):
        with pytest.raises(ValueError):
            eval_aggs(COLS, [_agg("median")])


class TestCycleBinding:
    def test_avg_reuses_sum_and_count(self):
        counter = {}
        aggs = [_agg("sum", out="s"), _agg("count", out="c"), _agg("avg", out="a")]
        eval_aggs(COLS, aggs, state_counter=counter)
        # Three aggregates, but sum and count each computed exactly once.
        assert counter[("v", None, "sum")] == 1
        assert counter[("v", None, "count")] == 1
        assert len(counter) == 2

    def test_distinct_conditions_not_conflated(self):
        counter = {}
        c1, c2 = Condition("qty", ">", 1), Condition("qty", ">", 2)
        eval_aggs(COLS, [_agg("sum", where=c1, out="s1"), _agg("sum", where=c2, out="s2")], state_counter=counter)
        assert len(counter) == 2


@pytest.mark.parametrize("func,params", [
    ("sum", ()), ("count", ()), ("min", ()), ("max", ()), ("avg", ()),
    ("distinct_count", ()), ("topn_frequency", (2,)), ("drawdown", ()),
])
@pytest.mark.parametrize("split", [0, 1, 3, 6])
class TestDecomposability:
    def test_split_merge_equals_full(self, func, params, split):
        cats = CATS
        full = finalize_state(func, partial_state(func, VALS), params)
        left = partial_state(func, VALS[:split])
        right = partial_state(func, VALS[split:])
        merged = finalize_state(func, merge_states(func, left, right), params)
        assert merged == full or merged == pytest.approx(full)


class TestDecomposabilityExtra:
    def test_avg_cate_decomposes(self):
        full = finalize_state("avg_cate", partial_state("avg_cate", VALS, CATS))
        l = partial_state("avg_cate", VALS[:2], CATS[:2])
        r = partial_state("avg_cate", VALS[2:], CATS[2:])
        assert finalize_state("avg_cate", merge_states("avg_cate", l, r)) == full

    def test_ew_avg_not_decomposable(self):
        assert "ew_avg" not in DECOMPOSABLE
        with pytest.raises(ValueError):
            partial_state("ew_avg", VALS)

    @settings(max_examples=100, deadline=None)
    @given(
        vals=st.lists(st.floats(min_value=0.1, max_value=1e6), min_size=1, max_size=40),
        cut=st.integers(min_value=0, max_value=40),
    )
    def test_drawdown_merge_property(self, vals, cut):
        v = np.asarray(vals)
        cut = min(cut, len(v))
        full = finalize_state("drawdown", partial_state("drawdown", v))
        merged = finalize_state(
            "drawdown",
            merge_states("drawdown", partial_state("drawdown", v[:cut]), partial_state("drawdown", v[cut:])),
        )
        assert merged == pytest.approx(full, abs=1e-12)

    def test_three_way_ordered_merge(self):
        parts = [partial_state("drawdown", VALS[i : i + 2]) for i in range(0, 6, 2)]
        st_ = parts[0]
        for p in parts[1:]:
            st_ = merge_states("drawdown", st_, p)
        assert finalize_state("drawdown", st_) == pytest.approx(0.75)


class TestSubtractAndEvict:
    def test_invertible_set(self):
        assert INVERTIBLE == {"sum", "count", "avg"}

    @pytest.mark.parametrize("func", ["sum", "count", "avg"])
    def test_sliding_equals_recompute(self, func):
        vals = [float(x) for x in [3, 1, 4, 1, 5, 9, 2, 6]]
        window = 3
        state = partial_state(func, np.asarray([]))
        for i, v in enumerate(vals):
            state = add_value(func, state, v)
            if i >= window:
                state = subtract_value(func, state, vals[i - window])
            lo = max(0, i - window + 1)
            expected = finalize_state(func, partial_state(func, np.asarray(vals[lo : i + 1])))
            assert finalize_state(func, state) == pytest.approx(expected)

    def test_min_not_invertible(self):
        with pytest.raises(ValueError):
            subtract_value("min", 1.0, 1.0)
