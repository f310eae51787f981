"""Tests for real-Spark operator-cost calibration (DESIGN.md §1)."""
import numpy as np
import pytest

from repro.sim.calibrate import (
    CalibrationPoint,
    _apply_operator,
    _micro_batch,
    fit_curve,
    measure_operator,
)


class TestMicroBatchOperators:
    @pytest.mark.parametrize(
        "op_type", ["map", "filter", "flatmap", "aggregate", "window_agg", "join"]
    )
    def test_analogue_runs(self, spark, op_type):
        df = _micro_batch(spark, 2000)
        out = _apply_operator(df, op_type)
        assert out.count() > 0

    def test_unknown_type(self, spark):
        with pytest.raises(ValueError):
            _apply_operator(_micro_batch(spark, 10), "source")


class TestFitCurve:
    def test_recovers_synthetic_curve(self):
        base, kappa = 50_000.0, 0.2
        pts = [
            CalibrationPoint("map", p, base * p / (1 + kappa * (p - 1)))
            for p in (1, 2, 4, 8)
        ]
        curve = fit_curve(pts)
        assert curve.base == pytest.approx(base, rel=0.1)
        assert curve.kappa == pytest.approx(kappa, abs=0.1)

    def test_linear_scaling_fits_zero_kappa(self):
        pts = [CalibrationPoint("map", p, 1000.0 * p) for p in (1, 2, 4, 8)]
        assert fit_curve(pts).kappa == pytest.approx(0.0, abs=0.05)


class TestMeasurement:
    def test_real_spark_throughput_shape(self, spark):
        """Measured on the live session: throughput is positive and the
        fitted curve family (sub-linear, monotone base) describes it —
        the engine's PA model is grounded in real execution."""
        points = measure_operator(
            spark, "aggregate", n_rows=60_000, partitions=(1, 4), repeats=1
        )
        assert all(p.records_per_sec > 0 for p in points)
        curve = fit_curve(points)
        assert curve.base > 0
        assert 0.0 <= curve.kappa <= 0.9
