"""Adaptive splitting optimizer tests (paper §5) — pure Python."""
import pytest

from repro.core.splitting import AdaptiveSplitter, LinearModel


# --------------------------------------------------------------- LinearModel
def test_empty_model_predicts_zero():
    assert LinearModel().predict(100) == 0.0


def test_single_point_predicts_constant():
    """One observation carries no slope information; extrapolating a
    per-unit ratio from a small observed size would smear fixed overhead
    and explode (the C_sl failure mode) — the estimate is the observation."""
    m = LinearModel()
    m.observe(10, 2.0)
    assert m.predict(20) == pytest.approx(2.0)
    assert m.predict(5) == pytest.approx(2.0)


def test_single_point_zero_x():
    m = LinearModel()
    m.observe(0, 3.0)
    assert m.predict(50) == pytest.approx(3.0)


def test_two_points_identify_fixed_overhead():
    """Affine fit separates per-view overhead from per-unit cost
    (within the clamped range)."""
    m = LinearModel()
    m.observe(100, 0.2 + 100 * 0.01)
    m.observe(1000, 0.2 + 1000 * 0.01)
    assert m.predict(1_400) == pytest.approx(0.2 + 14.0)


def test_two_points_exact_line():
    m = LinearModel()
    m.observe(0, 1.0)
    m.observe(10, 3.0)
    assert m.predict(5) == pytest.approx(2.0)
    assert m.predict(15) == pytest.approx(4.0)


def test_extrapolation_is_clamped():
    """Predictions far outside the sampled range are clamped to 1.5× the
    largest observed x — a slope fitted on small views must not be trusted
    orders of magnitude out (the C_sl adaptive failure mode)."""
    m = LinearModel()
    m.observe(0, 1.0)
    m.observe(10, 3.0)
    assert m.predict(1000) == pytest.approx(m.predict(15))


def test_fit_never_negative():
    m = LinearModel()
    m.observe(10, 1.0)
    m.observe(20, 0.5)
    assert m.predict(1000) >= 0.0


def test_degenerate_identical_x():
    m = LinearModel()
    m.observe(10, 1.0)
    m.observe(10, 3.0)
    assert m.predict(10) == pytest.approx(2.0)


def test_noisy_line_recovered():
    m = LinearModel()
    for x, noise in [(1, 0.01), (2, -0.02), (3, 0.01), (4, 0.0)]:
        m.observe(x, 2 * x + 1 + noise)
    assert m.predict(4) == pytest.approx(9.0, abs=0.2)


# ----------------------------------------------------------- AdaptiveSplitter
def test_bootstrap_order():
    s = AdaptiveSplitter()
    assert s.decide_batch([100], [10]) == "scratch"  # nothing observed yet
    s.observe_scratch(100, 1.0)
    assert s.decide_batch([100], [10]) == "diff"  # scratch known, diff not
    s.observe_diff(10, 0.1)
    assert s.decide_batch([100], [10]) in ("diff", "scratch")


def test_picks_diff_when_diffs_cheap():
    s = AdaptiveSplitter()
    s.observe_scratch(100, 10.0)
    s.observe_diff(10, 0.5)
    # tiny deltas → diff predicted far cheaper
    assert s.decide_batch([100, 100], [5, 5]) == "diff"


def test_picks_scratch_when_diffs_huge():
    s = AdaptiveSplitter()
    s.observe_scratch(100, 1.0)
    s.observe_scratch(200, 1.5)
    s.observe_diff(10, 0.5)
    s.observe_diff(50, 2.5)  # 0.05 s per diff unit
    # deltas as large as the views → diff predicted ~5× the scratch cost
    assert s.decide_batch([100, 100], [100, 100]) == "scratch"


def test_adapts_with_more_observations():
    s = AdaptiveSplitter()
    s.observe_scratch(100, 1.0)
    s.observe_scratch(200, 2.0)
    s.observe_diff(50, 2.0)
    s.observe_diff(100, 4.0)
    # diff is 4× the per-unit cost → scratch for equal sizes
    assert s.decide_batch([100], [100]) == "scratch"
    # but for tiny deltas diff wins
    assert s.decide_batch([100], [1]) == "diff"


def test_batch_sums_decide():
    s = AdaptiveSplitter()
    s.observe_scratch(100, 1.0)
    s.observe_scratch(300, 1.2)
    s.observe_diff(10, 0.2)
    s.observe_diff(100, 2.0)
    # per-view diff is cheaper on view 1 but ruinous on view 2; the batch
    # decision weighs the sum.
    assert s.decide_batch([100, 100], [1, 990]) == "scratch"
