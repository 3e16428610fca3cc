"""Update-cost behaviour (§6): counter changes track enclosureness.

Theorem 6.6 says the amortized update cost under a tree T is O(λ_T).
We measure the engine's own counter-change instrumentation (the paper's
cost accounting — Lemma C.1) on sequences with dialled λ.
"""
import pytest

from repro.bench.queries import hop3_full, star
from repro.core.enclosure import nested_sequence, tree_enclosureness
from repro.core.engine import CrownEngine
from repro.cq.join_tree import best_tree, free_connex_trees
from repro.cq.query import CQ, Relation
from repro.streams.sequences import fifo_window_sequence


def theorem67_query():
    """π_{x1}(R1(x1,x2) ⋈ R2(x2)) — the lower-bound query of Thm 6.7."""
    return CQ(
        (Relation("R1", ("x1", "x2")), Relation("R2", ("x2",))),
        output=("x1",),
        name="thm67",
    )


def counters_per_update(cq, tree, seq):
    eng = CrownEngine(cq, tree, emit_deltas=False)
    eng.run(seq)
    return eng.stats["counter_changes"] / max(1, eng.stats["updates"])


class TestLambdaScaling:
    def test_cost_scales_with_lambda(self):
        cq = theorem67_query()
        # R1 above R2: child churn drives P-UPDATEs through all parents
        tree = next(
            t
            for t in free_connex_trees(cq)
            if "R2" in t.subtree(t.relation_node("R1"))
        )
        costs = []
        for lam in (1, 2, 4, 8, 16):
            seq = nested_sequence("R1", "R2", lam)
            costs.append(counters_per_update(cq, tree, seq))
        # per-update counter changes grow ~linearly in λ (Theorem 6.6)
        assert costs[-1] > 4 * costs[0]
        assert all(b >= a * 0.9 for a, b in zip(costs, costs[1:]))

    def test_cost_constant_for_fifo_height2(self):
        # Lemma 6.9: FIFO + height-2 tree ⇒ λ_T = 1 ⇒ O(1)/update
        bq = hop3_full()
        tree = best_tree(bq.cq)
        rows, seen = [], set()
        for i in range(400):
            t = (i % 23, (i * 7 + 3) % 23)
            if t not in seen:
                seen.add(t)
                rows.append(("G", t))
        small = fifo_window_sequence(rows[:100], 30)
        large = fifo_window_sequence(rows, 30)
        c_small = counters_per_update(bq.cq, tree, small)
        c_large = counters_per_update(bq.cq, tree, large)
        # amortized cost does not grow with the stream length
        assert c_large < 2 * c_small + 5

    def test_cost_constant_insertion_only(self):
        # Lemma 6.10 / Theorem 6.11: insertion-only ⇒ O(1) amortized
        from repro.streams.sequences import insertion_only_sequence

        bq = hop3_full()
        rows = [("G", ((i * 5) % 29, (i * 11 + 1) % 29)) for i in range(300)]
        rows = list(dict.fromkeys(rows))
        seq = insertion_only_sequence(rows)
        cost = counters_per_update(bq.cq, best_tree(bq.cq), seq)
        assert cost < 25  # small constant, independent of n

    def test_qhierarchical_constant_arbitrary_updates(self):
        # Berkholz et al. recovery: q-hierarchical queries cost O(1)
        # per update even on adversarial (nested) sequences
        from repro.streams.sequences import from_lifespans

        bq = star()
        tree = best_tree(bq.cq)
        assert tree.height == 1
        k = 16
        rows = [("G", (p, 0), 0.0, float(2 * k + 1)) for p in range(k)]
        rows += [("G", (0, 9), 2 * i + 0.5, 2 * i + 1.5) for i in range(k)]
        seq = from_lifespans(rows)
        cost = counters_per_update(bq.cq, tree, seq)
        assert cost < 20


class TestPlanChoiceMatters:
    def test_example_612_flavour(self):
        """Example 6.5/6.12: on the same sequence the height-1 tree is
        O(1)/update while the bad rooted tree pays Θ(λ)."""
        cq = CQ(
            (Relation("R1", ("x1", "x2")), Relation("R2", ("x2",))),
            output=("x2",),
            name="q1_proj",
        )
        trees = free_connex_trees(cq)
        t_flat = next(t for t in trees if t.height == 1)
        t_deep = next(
            t
            for t in trees
            if t.height == 2 and "R2" in t.subtree(t.relation_node("R1"))
        )
        seq = nested_sequence("R1", "R2", 12)
        c_flat = counters_per_update(cq, t_flat, seq)
        c_deep = counters_per_update(cq, t_deep, seq)
        assert c_deep > 3 * c_flat
        # and λ_T predicts it
        assert tree_enclosureness(seq, cq, t_flat) == 1.0
        assert tree_enclosureness(seq, cq, t_deep) > 4
