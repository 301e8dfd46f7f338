"""Unit and property tests for Q-error (repro.core.qerror)."""
import pytest
from hypothesis import given, strategies as st

from repro.core.qerror import qerror, triggers


def test_exact_estimate_is_one():
    assert qerror(100, 100) == 1.0


def test_under_and_over_are_symmetric():
    assert qerror(10, 1000) == qerror(1000, 10) == 100.0


def test_zero_clamps_to_one_row():
    assert qerror(0, 50) == 50.0
    assert qerror(50, 0) == 50.0
    assert qerror(0, 0) == 1.0


@given(
    st.floats(min_value=0, max_value=1e12),
    st.floats(min_value=0, max_value=1e12),
)
def test_qerror_at_least_one_and_symmetric(a, b):
    assert qerror(a, b) >= 1.0
    assert qerror(a, b) == pytest.approx(qerror(b, a))


def test_triggers_at_threshold_inclusive():
    assert triggers(10, 320, 32.0)
    assert triggers(320, 10, 32.0)
    assert not triggers(10, 319, 32.0)


def test_triggers_rejects_bad_threshold():
    with pytest.raises(ValueError):
        triggers(1, 1, 0.5)


@given(st.floats(min_value=1, max_value=1e9))
def test_never_triggers_on_exact(true):
    assert not triggers(true, true, 2.0)
