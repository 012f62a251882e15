"""Use-case 2 tests: memory compression with a target ratio (Fig. 11)."""
import numpy as np
import pytest

from repro import sci_data
from repro.usecases.memory_target import (
    HEADROOM,
    GroupResult,
    plan_and_compress,
    run_groups,
)


def test_plan_hits_headroom_target():
    d = sci_data.rtm_snapshot(2000, (12, 24, 24))
    r = plan_and_compress(d, budget_bits_per_point=4.0, seed=1)
    assert r["target_bitrate"] == pytest.approx(HEADROOM * 4.0)
    # model lands on its own target
    assert r["est_bitrate"] == pytest.approx(r["target_bitrate"], abs=0.15)
    # real compression stays within the assigned budget
    assert r["used_bitrate"] <= 4.0 * 1.05


def test_plan_budget_eb_direction():
    d = sci_data.rtm_snapshot(2000, (12, 24, 24))
    tight = plan_and_compress(d, 2.0, seed=3)["eb_abs"]  # few bits → big eb
    loose = plan_and_compress(d, 6.0, seed=3)["eb_abs"]  # many bits → small eb
    assert tight > loose


def test_run_groups_shapes_and_overflow_rate():
    res = run_groups(n_groups=8, shape=(8, 24, 24), seed=0)
    assert len(res) == 8
    assert all(isinstance(g, GroupResult) for g in res)
    # used/assigned hovers near HEADROOM, and overflows are the exception
    # (paper: ~5%; tolerate up to 25% on the tiny test volume)
    ratios = [g.used_over_assigned for g in res]
    assert np.median(ratios) < 1.0
    assert np.mean([g.overflow for g in res]) <= 0.25


def test_group_result_properties():
    g = GroupResult(0, (1000,), budget_bits_per_point=4.0, used_bits_per_point=3.2)
    assert g.used_over_assigned == pytest.approx(0.8)
    assert not g.overflow
    assert GroupResult(0, (1000,), 4.0, 4.4).overflow
