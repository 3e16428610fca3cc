"""Fig. 9 — maintenance cost vs enclosureness λ.

Nested sequences with dialled λ on the Theorem-6.7 query
π_{x1}(R1(x1,x2) ⋈ R2(x2)); output disabled as in the paper. The shape
to reproduce: cost grows ~linearly with λ.
"""
import pytest

from repro.core.enclosure import nested_sequence
from repro.core.engine import CrownEngine
from repro.cq.join_tree import free_connex_trees
from repro.cq.query import CQ, Relation

LAMBDAS = [1, 4, 16, 64]


def thm67_cq():
    return CQ(
        (Relation("R1", ("x1", "x2")), Relation("R2", ("x2",))),
        output=("x1",),
        name="thm67",
    )


@pytest.mark.parametrize("lam", LAMBDAS)
def test_fig9_lambda(benchmark, lam):
    cq = thm67_cq()
    tree = next(
        t
        for t in free_connex_trees(cq)
        if "R2" in t.subtree(t.relation_node("R1"))
    )
    seq = list(nested_sequence("R1", "R2", lam, scale=4))

    def once():
        eng = CrownEngine(cq, tree, emit_deltas=False)
        eng.run(seq)
        return eng

    eng = benchmark.pedantic(once, rounds=2, iterations=1)
    benchmark.extra_info.update(
        updates=eng.stats["updates"],
        counter_changes=eng.stats["counter_changes"],
        per_update=round(
            eng.stats["counter_changes"] / max(1, eng.stats["updates"]), 2
        ),
    )
