"""Unit tests for the reference factor-graph semantics (paper §6)."""
import math

import pytest

from repro.core.factor_graph import Factor, FactorGraph
from repro.core.kde import EPS


def graph(*factors, n_obs=4):
    g = FactorGraph()
    for i in range(n_obs):
        g.add_observation(i)
    for f in factors:
        g.add_factor(f)
    return g


class TestFactorGraph:
    def test_unknown_observation_rejected(self):
        g = graph()
        with pytest.raises(KeyError):
            g.add_factor(Factor("vol", (99,), 0.5))

    def test_single_observation_score(self):
        g = graph(Factor("vol", (0,), 0.5), Factor("vel", (0,), 0.25))
        assert g.score([0]) == pytest.approx((math.log(0.5) + math.log(0.25)) / 2)

    def test_paper_worked_example(self):
        # §6: volumes scored 0.37 and 0.39, velocity 0.21 →
        # (ln .37 + ln .39 + ln .21)/3 = −1.17.
        g = graph(
            Factor("vol", (0,), 0.37),
            Factor("vol", (1,), 0.39),
            Factor("vel", (1,), 0.21),
        )
        assert g.score([0, 1]) == pytest.approx(-1.17, abs=0.005)

    def test_normalization_makes_sizes_comparable(self):
        # A 2-obs and a 4-obs component with the same per-factor
        # likelihood score identically (§6's normalization rationale).
        small = graph(*[Factor("vol", (i,), 0.5) for i in range(2)])
        big = graph(*[Factor("vol", (i,), 0.5) for i in range(4)])
        assert small.score([0, 1]) == pytest.approx(big.score([0, 1, 2, 3]))

    def test_no_connected_factors_none(self):
        g = graph(Factor("vol", (0,), 0.5))
        assert g.score([1]) is None

    def test_zeroing_aof_removes_component(self):
        g = graph(
            Factor("vol", (0,), 0.9),
            Factor("filter", (0,), 1.0, aof=lambda x: 0.0),
        )
        assert g.score([0]) == -math.inf

    def test_invert_aof(self):
        g = graph(Factor("vol", (0,), 0.9, aof=lambda x: 1 - x))
        assert g.score([0]) == pytest.approx(math.log(0.1), abs=1e-9)

    def test_group_factor_counts_once(self):
        # A track-level factor connecting several observations is one
        # factor in the normalization.
        g = graph(
            Factor("vol", (0,), 0.5),
            Factor("vol", (1,), 0.5),
            Factor("track_len", (0, 1), 0.8),
        )
        expected = (2 * math.log(0.5) + math.log(0.8)) / 3
        assert g.score([0, 1]) == pytest.approx(expected)

    def test_partial_component_overlap(self):
        # A factor connects if it touches any obs in the component.
        g = graph(Factor("pair", (0, 1), 0.6))
        assert g.score([0]) == pytest.approx(math.log(0.6))

    def test_rank_orders_and_filters(self):
        g = graph(
            Factor("vol", (0,), 0.9),
            Factor("vol", (1,), 0.1),
            Factor("kill", (2,), 1.0, aof=lambda x: 0.0),
        )
        ranked = g.rank({"a": [0], "b": [1], "c": [2], "d": [3]})
        assert ranked == [("a", pytest.approx(math.log(0.9))),
                          ("b", pytest.approx(math.log(0.1)))]

    def test_tiny_probability_floored(self):
        g = graph(Factor("vol", (0,), 1e-300))
        assert g.score([0]) == pytest.approx(math.log(EPS))

    def test_connected_factors_listing(self):
        f1 = Factor("vol", (0,), 0.5)
        f2 = Factor("vol", (1,), 0.5)
        g = graph(f1, f2)
        assert g.connected_factors([0]) == [f1]
        assert len(g.connected_factors([0, 1])) == 2
