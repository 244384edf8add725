"""Unit tests for the Alg. 2 plan optimizer."""
import numpy as np
import pytest

from repro.core.cost import CostModel
from repro.core.hypertree import find_hypertree
from repro.core.optimizer import PlanChoice, optimize
from repro.core.query import get_query
from repro.synth_data import tiny_graph_pdf


def db_for(qname, edges):
    q = get_query(qname)
    rows = edges[["src", "dst"]].to_numpy()
    return q, {r.name: (r.attrs, rows) for r in q.relations}


def model(beta_raw=10.0, beta_pre=10_000.0, alpha=1e6, gamma=1e6, M=None):
    return CostModel(
        alpha=alpha,
        beta_pre=beta_pre,
        beta_raw=beta_raw,
        gamma=gamma,
        n_servers=4,
        memory_tuples=M,
    )


class TestOptimize:
    def test_returns_valid_plan(self):
        q, db = db_for("Q4", tiny_graph_pdf())
        plan = optimize(q, db, model(), sample_k=30)
        assert isinstance(plan, PlanChoice)
        assert sorted(plan.order) == sorted(q.attrs)
        assert sorted(plan.traversal) == list(range(len(plan.hypertree.bags)))
        # traversal is a valid (prefix-connected) order
        t = plan.hypertree
        for i in range(1, len(plan.traversal) + 1):
            assert t.is_connected_subset(set(plan.traversal[:i]))

    def test_attribute_order_is_hypertree_valid(self):
        q, db = db_for("Q5", tiny_graph_pdf())
        plan = optimize(q, db, model(), sample_k=30)
        assert plan.hypertree.is_valid_attribute_order(plan.order)

    def test_precompute_only_multi_relation_bags(self):
        q, db = db_for("Q6", tiny_graph_pdf())
        plan = optimize(q, db, model(), sample_k=30)
        for i in plan.precompute:
            assert plan.hypertree.bags[i].needs_precompute

    def test_cheap_computation_means_no_precompute(self):
        """If raw extension is as fast as pre-computed extension there is
        no computation to trade — the optimizer must keep C empty."""
        q, db = db_for("Q4", tiny_graph_pdf())
        cm = model(beta_raw=1e9, beta_pre=1e9, alpha=1e3, gamma=1e3)
        plan = optimize(q, db, cm, sample_k=30, beta_source="model")
        assert plan.precompute == frozenset()

    def test_expensive_computation_triggers_precompute(self):
        """If raw extension is catastrophically slow while shuffles and
        pre-joins are free, pre-computing must be selected for Q4 (which
        has multi-relation bags)."""
        q, db = db_for("Q4", tiny_graph_pdf())
        cm = model(beta_raw=1e-3, beta_pre=1e9, alpha=1e9, gamma=1e9)
        plan = optimize(q, db, cm, sample_k=30, beta_source="model")
        assert len(plan.precompute) > 0

    def test_final_relations_consistency(self):
        q, db = db_for("Q5", tiny_graph_pdf())
        plan = optimize(
            q, db, model(beta_raw=1e-3, beta_pre=1e9), sample_k=30,
            beta_source="model",
        )
        rels = plan.final_relations()
        names = [n for n, _ in rels]
        assert len(names) == len(set(names))
        # every original relation accounted for: either directly or
        # inside a pre-computed bag
        covered = set()
        for n, attrs in rels:
            if n.startswith("bag"):
                idx = int(n[3:])
                covered |= {
                    r.name for r in plan.hypertree.bags[idx].relations
                }
            else:
                covered.add(n)
        assert covered == {r.name for r in q.relations}

    def test_est_breakdown_present(self):
        q, db = db_for("Q4", tiny_graph_pdf())
        plan = optimize(q, db, model(), sample_k=30)
        assert "rounds" in plan.est and len(plan.est["rounds"]) == len(
            plan.hypertree.bags
        )
        assert plan.est["cost_C"] >= 0

    def test_shares_cover_all_attrs(self):
        q, db = db_for("Q2", tiny_graph_pdf())
        plan = optimize(q, db, model(M=500), sample_k=30)
        assert set(plan.shares.p) == set(q.attrs)

    def test_single_bag_query(self):
        """Q1's hypertree is effectively one bag — the optimizer must
        still return a working plan."""
        q, db = db_for("Q1", tiny_graph_pdf())
        plan = optimize(q, db, model(), sample_k=30)
        assert sorted(plan.order) == ["a", "b", "c"]

    def test_explicit_hypertree_respected(self):
        q, db = db_for("Q4", tiny_graph_pdf())
        t = find_hypertree(q)
        plan = optimize(q, db, model(), sample_k=30, hypertree=t)
        assert plan.hypertree is t

    def test_sampled_beta_source_runs(self):
        """The default sampled-β path (§III-B measurement) produces a
        valid plan too."""
        q, db = db_for("Q4", tiny_graph_pdf())
        plan = optimize(q, db, model(), sample_k=20, beta_source="sampled")
        assert sorted(plan.order) == sorted(q.attrs)
        assert plan.est["beta_raw"] > 0

    def test_bad_beta_source_rejected(self):
        q, db = db_for("Q1", tiny_graph_pdf())
        with pytest.raises(ValueError):
            optimize(q, db, model(), beta_source="guess")
