"""Cost model and execution simulator tests."""
import pytest

from repro.core.cost import CostModel, ExecutionSimulator
from repro.core.plans import Join, Leaf


@pytest.fixture()
def cm():
    return CostModel(c_scan=1, c_build=2, c_probe=1, c_out=3, c_overhead=10)


@pytest.fixture()
def es():
    return ExecutionSimulator(
        c_scan=1, c_build=2, c_probe=1, c_out=3,
        c_overhead=10, mem_rows=100, spill_factor=4, c_mat=5,
    )


def test_scan_cost(cm):
    assert cm.scan_cost(100) == 10 + 100


def test_join_cost_builds_smaller_side(cm):
    assert cm.join_cost(10, 1000, 50) == 10 + 2 * 10 + 1000 + 3 * 50
    assert cm.join_cost(1000, 10, 50) == cm.join_cost(10, 1000, 50)


def test_sim_join_time_no_spill(es):
    assert es.join_time(10, 1000, 50) == 10 + 20 + 1000 + 150


def test_sim_spill_penalty_applies_to_build_only(es):
    base = es.join_time(99, 1000, 0)
    spilled = es.join_time(101, 1000, 0)
    assert spilled == pytest.approx(10 + 4 * 2 * 101 + 1000)
    assert spilled > base


def test_sim_scan_time(es):
    assert es.scan_time(40) == 10 + 40


def test_materialize_time(es):
    assert es.materialize_time(100) == 10 + 5 * 100


def test_plan_time_sums_nodes(es):
    ab = Join(Leaf("a", 0), Leaf("b", 0), 0)
    root = Join(ab, Leaf("c", 0), 0)
    cards = {
        frozenset({"a"}): 10,
        frozenset({"b"}): 20,
        frozenset({"c"}): 30,
        frozenset({"a", "b"}): 5,
        frozenset({"a", "b", "c"}): 2,
    }
    expected = (
        es.scan_time(10) + es.scan_time(20) + es.scan_time(30)
        + es.join_time(10, 20, 5) + es.join_time(5, 30, 2)
    )
    assert es.plan_time(root, cards) == pytest.approx(expected)


def test_defaults_planner_blind_spots():
    cm, es = CostModel(), ExecutionSimulator()
    # planner assumes half the true per-operator overhead...
    assert cm.c_overhead < es.c_overhead
    # ...and underrates output cost (no spill model at all).
    assert cm.c_out < es.c_out


def test_cost_monotone_in_cards(cm):
    assert cm.join_cost(10, 100, 10) < cm.join_cost(10, 100, 1000)
    assert cm.join_cost(10, 100, 10) < cm.join_cost(50, 100, 10)
