"""Weight functions and MDP state construction (Eqs. 19–22)."""
import numpy as np
import pytest

from repro.core.patterns import PATTERN_EDGES
from repro.core.reservoir import Reservoir
from repro.core.weights import (
    WeightContext,
    build_state,
    heuristic_weight,
    make_learned_weight,
    uniform_weight,
)


def _reservoir_with(edges_with_t):
    r = Reservoir(100)
    for (u, v), t in edges_with_t:
        r.add((min(u, v), max(u, v)), 1.0, float(10 + t), t)
    return r


def _ctx(pattern, inst, res, u=0, v=1, t=10):
    return WeightContext(u, v, t, pattern, inst, res)


def test_uniform_weight():
    res = Reservoir(10)
    assert uniform_weight(_ctx("triangle", [], res)) == 1.0


def test_heuristic_weight_formula():
    res = _reservoir_with([((0, 2), 1), ((1, 2), 2), ((0, 3), 3), ((1, 3), 4)])
    inst = [(((0, 2)), ((1, 2))), (((0, 3)), ((1, 3)))]
    assert heuristic_weight(_ctx("triangle", inst, res)) == 9.0 * 2 + 1


def test_heuristic_weight_no_instances():
    assert heuristic_weight(_ctx("triangle", [], Reservoir(5))) == 1.0


@pytest.mark.parametrize("pattern", sorted(PATTERN_EDGES))
def test_state_dimension(pattern):
    s = build_state(_ctx(pattern, [], Reservoir(5)), "max")
    assert s.shape == (PATTERN_EDGES[pattern] + 3,)


def test_state_topological_part():
    res = _reservoir_with([((0, 2), 1), ((1, 2), 2), ((0, 3), 3)])
    inst = [((0, 2), (1, 2))]
    s = build_state(_ctx("triangle", inst, res, u=0, v=1, t=10), "max")
    assert s[0] == 1  # |H_k|
    assert s[1] == res.degree(0) == 2
    assert s[2] == res.degree(1) == 1


def test_state_temporal_max(   ):
    """v_j = max over instances of the j-th smallest arrival index (Eq. 20),
    normalised by t; the focal edge is always the last index so v_|H|/t = 1."""
    res = _reservoir_with([((0, 2), 2), ((1, 2), 4), ((0, 3), 6), ((1, 3), 8)])
    inst = [((0, 2), (1, 2)), ((0, 3), (1, 3))]
    s = build_state(_ctx("triangle", inst, res, t=10), "max")
    np.testing.assert_allclose(s[3:], [max(2, 6) / 10, max(4, 8) / 10, 1.0])


def test_state_temporal_avg():
    res = _reservoir_with([((0, 2), 2), ((1, 2), 4), ((0, 3), 6), ((1, 3), 8)])
    inst = [((0, 2), (1, 2)), ((0, 3), (1, 3))]
    s = build_state(_ctx("triangle", inst, res, t=10), "avg")
    np.testing.assert_allclose(s[3:], [(2 + 6) / 2 / 10, (4 + 8) / 2 / 10, 1.0])


def test_state_no_instances_zero_temporal():
    s = build_state(_ctx("triangle", [], Reservoir(5)), "max")
    np.testing.assert_allclose(s[3:], 0.0)


def test_state_wedge_positions():
    res = _reservoir_with([((0, 2), 5)])
    inst = [((0, 2),)]
    s = build_state(_ctx("wedge", inst, res, t=20), "max")
    np.testing.assert_allclose(s[3:], [5 / 20, 1.0])


def test_make_learned_weight_calls_actor():
    got = {}

    def actor(state):
        got["state"] = state
        return 3.5

    fn = make_learned_weight(actor, "max")
    res = Reservoir(5)
    w = fn(_ctx("triangle", [], res))
    assert w == 3.5
    assert got["state"].shape == (6,)
