"""Unit tests for the HCube share optimizer (Eq. (3))."""
import math

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.hcube.shares import (
    Shares,
    comm_tuples,
    dup,
    frac,
    optimize_shares,
    server_load,
    _vectors,
)

ATTRS = ("a", "b", "c")
TRIANGLE = [
    (("a", "b"), 100),
    (("b", "c"), 100),
    (("a", "c"), 100),
]


class TestPrimitives:
    def test_dup(self):
        p = {"a": 2, "b": 3, "c": 4}
        assert dup(("a", "b"), p) == 4
        assert dup(("a", "b", "c"), p) == 1
        assert dup((), p) == 24

    def test_frac(self):
        p = {"a": 2, "b": 3, "c": 4}
        assert frac(("a", "b"), p) == pytest.approx(1 / 6)
        assert frac(("a", "b", "c"), p) == pytest.approx(1 / 24)

    def test_comm_tuples(self):
        p = {"a": 2, "b": 2, "c": 1}
        # each binary relation is duplicated by the share of its free attr
        assert comm_tuples(TRIANGLE, p) == 100 * 1 + 100 * 2 + 100 * 2

    def test_server_load(self):
        p = {"a": 2, "b": 2, "c": 1}
        assert server_load(TRIANGLE, p) == pytest.approx(
            100 / 4 + 100 / 2 + 100 / 2
        )

    def test_vectors_enumeration(self):
        vecs = list(_vectors(["a", "b"], 4))
        assert {tuple(sorted(v.items())) for v in vecs} == {
            (("a", 1), ("b", 1)),
            (("a", 1), ("b", 2)),
            (("a", 1), ("b", 3)),
            (("a", 1), ("b", 4)),
            (("a", 2), ("b", 1)),
            (("a", 2), ("b", 2)),
            (("a", 3), ("b", 1)),
            (("a", 4), ("b", 1)),
        }


class TestOptimizeShares:
    def test_no_memory_constraint_degenerates_to_ones(self):
        """Without M the comm optimum is p = 1 (no duplication at all) —
        the degenerate single-server plan, which is why the memory bound
        is what forces genuine partitioning."""
        sh = optimize_shares(ATTRS, TRIANGLE, 8, memory_tuples=None)
        assert all(v == 1 for v in sh.p.values())
        assert sh.comm == 300

    def test_memory_forces_partitioning(self):
        sh = optimize_shares(ATTRS, TRIANGLE, 8, memory_tuples=150)
        assert sh.feasible
        assert sh.load <= 150
        assert math.prod(sh.p.values()) > 1

    def test_triangle_symmetric_shares(self):
        """With a tight budget the classic triangle optimum spreads shares
        over the three attributes (e.g. 2×2×2 at P=8)."""
        sh = optimize_shares(ATTRS, TRIANGLE, 8, memory_tuples=80)
        assert sh.feasible
        assert sorted(sh.p.values()) == [2, 2, 2]

    def test_infeasible_falls_back_to_min_load(self):
        sh = optimize_shares(ATTRS, TRIANGLE, 4, memory_tuples=1)
        assert not sh.feasible
        # min load at P<=4 for the triangle: best effort split
        assert sh.load == min(
            server_load(TRIANGLE, p) for p in _vectors(list(ATTRS), 4)
        )

    def test_skewed_relation_sizes(self):
        """A big relation should not be the duplicated one."""
        rels = [(("a", "b"), 1000), (("b", "c"), 10)]
        sh = optimize_shares(("a", "b", "c"), rels, 4, memory_tuples=600)
        # duplicating the small relation (share on a) is cheaper than
        # duplicating the big one (share on c)
        assert sh.p["c"] == 1
        assert sh.comm < 1000 + 10 * 4

    def test_unknown_attr_rejected(self):
        with pytest.raises(ValueError):
            optimize_shares(("a",), [(("a", "z"), 10)], 4)

    def test_result_type_and_product_bound(self):
        sh = optimize_shares(ATTRS, TRIANGLE, 6, memory_tuples=200)
        assert isinstance(sh, Shares)
        assert math.prod(sh.p.values()) <= 6


@settings(max_examples=40, deadline=None)
@given(
    sizes=st.lists(st.integers(1, 500), min_size=3, max_size=3),
    P=st.integers(1, 12),
)
def test_optimum_beats_all_vectors(sizes, P):
    """The returned vector is truly optimal among the enumeration."""
    rels = [(("a", "b"), sizes[0]), (("b", "c"), sizes[1]), (("a", "c"), sizes[2])]
    M = sum(sizes)  # always feasible at p=1
    sh = optimize_shares(ATTRS, rels, P, memory_tuples=M)
    assert sh.feasible
    for p in _vectors(list(ATTRS), P):
        if server_load(rels, p) <= M:
            assert sh.comm <= comm_tuples(rels, p)
