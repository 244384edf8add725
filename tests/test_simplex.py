"""Unit tests for the LP substrate (two-phase simplex + fractional cover)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.lp.simplex import LPResult, fractional_edge_cover, solve_lp


class TestSolveLP:
    def test_simple_cover(self):
        # min x1+x2 s.t. x1>=1, x2>=1
        res = solve_lp(np.ones(2), np.eye(2), np.ones(2))
        assert res.status == "optimal"
        assert res.objective == pytest.approx(2.0)

    def test_shared_constraint(self):
        # min x1+x2 s.t. x1+x2 >= 1 → objective 1
        res = solve_lp(np.ones(2), np.ones((1, 2)), np.ones(1))
        assert res.status == "optimal"
        assert res.objective == pytest.approx(1.0)

    def test_fractional_optimum_triangle(self):
        # triangle cover LP: 3 edges ab, bc, ca; each vertex needs >= 1
        A = np.array([[1, 0, 1], [1, 1, 0], [0, 1, 1]], dtype=float)
        res = solve_lp(np.ones(3), A, np.ones(3))
        assert res.status == "optimal"
        assert res.objective == pytest.approx(1.5)

    def test_infeasible(self):
        # x1 >= 1 and -x1 >= 0 (i.e. x1 <= 0) with x1 >= 0 → infeasible
        res = solve_lp(
            np.ones(1), np.array([[1.0], [-1.0]]), np.array([1.0, 0.5])
        )
        assert res.status == "infeasible"

    def test_unbounded(self):
        # min -x s.t. x >= 0 (constraint x >= 0 trivial) → unbounded below
        res = solve_lp(np.array([-1.0]), np.array([[1.0]]), np.array([0.0]))
        assert res.status == "unbounded"

    def test_weighted_objective(self):
        # min 3x1 + x2 s.t. x1+x2>=2: all weight on x2
        res = solve_lp(
            np.array([3.0, 1.0]), np.array([[1.0, 1.0]]), np.array([2.0])
        )
        assert res.objective == pytest.approx(2.0)
        assert res.x[1] == pytest.approx(2.0)

    def test_shape_mismatch(self):
        with pytest.raises(ValueError):
            solve_lp(np.ones(2), np.eye(3), np.ones(3))

    def test_result_type(self):
        res = solve_lp(np.ones(1), np.eye(1), np.ones(1))
        assert isinstance(res, LPResult)
        assert res.x.shape == (1,)

    @settings(max_examples=60, deadline=None)
    @given(
        n=st.integers(1, 4),
        m=st.integers(1, 4),
        data=st.data(),
    )
    def test_feasible_covers_respect_constraints(self, n, m, data):
        """Random 0/1 covering LPs: the solver's optimum is feasible and no
        worse than the all-ones cover (which is feasible whenever every
        row has a nonzero)."""
        A = np.array(
            data.draw(
                st.lists(
                    st.lists(st.integers(0, 1), min_size=n, max_size=n),
                    min_size=m,
                    max_size=m,
                )
            ),
            dtype=float,
        )
        if (A.sum(axis=1) == 0).any():
            return
        res = solve_lp(np.ones(n), A, np.ones(m))
        assert res.status == "optimal"
        assert (A @ res.x >= 1 - 1e-7).all()
        assert (res.x >= -1e-9).all()
        assert res.objective <= n + 1e-7


class TestFractionalEdgeCover:
    def test_single_edge(self):
        rho, x = fractional_edge_cover(["a", "b"], [frozenset({"a", "b"})])
        assert rho == pytest.approx(1.0)
        assert x[0] == pytest.approx(1.0)

    def test_triangle_is_three_halves(self):
        edges = [frozenset(p) for p in [("a", "b"), ("b", "c"), ("a", "c")]]
        rho, _ = fractional_edge_cover(["a", "b", "c"], edges)
        assert rho == pytest.approx(1.5)

    def test_five_clique_is_five_halves(self):
        attrs = list("abcde")
        edges = [
            frozenset({x, y}) for x in attrs for y in attrs if x < y
        ]
        rho, _ = fractional_edge_cover(attrs, edges)
        assert rho == pytest.approx(2.5)

    def test_odd_cycle_five(self):
        # fractional cover of C5 = 5/2
        attrs = list("abcde")
        edges = [
            frozenset(p)
            for p in [("a", "b"), ("b", "c"), ("c", "d"), ("d", "e"), ("e", "a")]
        ]
        rho, _ = fractional_edge_cover(attrs, edges)
        assert rho == pytest.approx(2.5)

    def test_subset_attrs(self):
        edges = [frozenset({"a", "b"}), frozenset({"b", "c"})]
        rho, _ = fractional_edge_cover(["b"], edges)
        assert rho == pytest.approx(1.0)

    def test_empty_attrs(self):
        rho, x = fractional_edge_cover([], [frozenset({"a"})])
        assert rho == 0.0

    def test_uncovered_attr_raises(self):
        with pytest.raises(ValueError):
            fractional_edge_cover(["z"], [frozenset({"a", "b"})])

    def test_irrelevant_edges_get_zero_weight(self):
        edges = [frozenset({"a", "b"}), frozenset({"x", "y"})]
        rho, x = fractional_edge_cover(["a"], edges)
        assert rho == pytest.approx(1.0)
        assert x[1] == pytest.approx(0.0)
