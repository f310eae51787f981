"""Hypothesis property tests for cross-cutting simulator/tuning
invariants — the physics the monotonic constraint relies on."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.graphs.dag import DataflowDAG, Operator
from repro.sim.engine import processing_ability, simulate


def _chain():
    return DataflowDAG(
        "prop",
        [
            Operator("src", "source"),
            Operator("f", "filter", selectivity=0.6),
            Operator("w", "window_agg", selectivity=0.2),
            Operator("k", "sink"),
        ],
        [("src", "f"), ("f", "w"), ("w", "k")],
        {"src": "in"},
    )


class TestMonotonePhysics:
    @settings(max_examples=40, deadline=None)
    @given(
        p=st.integers(1, 99),
        op_type=st.sampled_from(["map", "filter", "join", "window_agg"]),
    )
    def test_pa_strictly_increasing(self, p, op_type):
        op = Operator("x", op_type)
        assert processing_ability(op, p + 1) > processing_ability(op, p)

    @settings(max_examples=30, deadline=None)
    @given(
        p_f=st.integers(1, 30),
        p_w=st.integers(1, 30),
        mult=st.floats(0.5, 12.0),
        seed=st.integers(0, 50),
    )
    def test_more_parallelism_never_creates_bottleneck(self, p_f, p_w, mult, seed):
        """If an operator is not a bottleneck cause at parallelism p, it
        is not one at p+5 either (same rates, same seed) — the
        assumption behind StreamTune's monotonic constraint."""
        dag = _chain()
        rate = 100_000.0 * mult
        lo = simulate(dag, {"f": p_f, "w": p_w}, {"in": rate}, seed=seed)
        hi = simulate(dag, {"f": p_f + 5, "w": p_w}, {"in": rate}, seed=seed)
        if not lo.metrics["f"].is_bottleneck_cause:
            assert not hi.metrics["f"].is_bottleneck_cause

    @settings(max_examples=30, deadline=None)
    @given(p_w=st.integers(1, 40), seed=st.integers(0, 20))
    def test_throttle_nondecreasing_in_parallelism(self, p_w, seed):
        dag = _chain()
        rate = 400_000.0
        a = simulate(dag, {"f": 10, "w": p_w}, {"in": rate}, seed=seed)
        b = simulate(dag, {"f": 10, "w": p_w + 3}, {"in": rate}, seed=seed)
        assert b.throttle >= a.throttle - 1e-9

    @settings(max_examples=30, deadline=None)
    @given(mult=st.floats(0.1, 20.0), seed=st.integers(0, 20))
    def test_conservation(self, mult, seed):
        """Processed rate never exceeds offered input, outputs respect
        selectivity, busy/idle/backpressured fractions partition time."""
        dag = _chain()
        res = simulate(dag, {"f": 4, "w": 4}, {"in": 50_000.0 * mult}, seed=seed)
        for oid, m in res.metrics.items():
            assert m.processed_rate <= m.input_rate + 1e-6
            assert 0 <= m.busy <= 1
            assert 0 <= m.backpressured <= 1
            assert abs(m.busy + m.idle + m.backpressured - 1.0) < 1e-6
        f, w = res.metrics["f"], res.metrics["w"]
        assert w.input_rate == abs(f.output_rate) or np.isclose(w.input_rate, f.output_rate)
