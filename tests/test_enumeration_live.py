"""Full enumeration (Algorithm 5) and live views (Lemma 5.5)."""
import pytest

from repro.bench.queries import GRAPH_QUERIES
from repro.core.engine import CrownEngine
from repro.cq.join_tree import best_tree
from repro.cq.query import CQ, Relation
from repro.streams.sequences import Update
from tests._util import expected_result, random_updates


@pytest.mark.parametrize("name", sorted(GRAPH_QUERIES))
def test_full_enumeration_matches_naive(name):
    bq = GRAPH_QUERIES[name]()
    arity = {"G": 2, "V1": 1, "V2": 1} if name == "2comb" else {"G": 2}
    eng = CrownEngine(bq.cq, post_filter=bq.post_filter)
    dbs = {s: set() for s in arity}
    for s, t, ins in random_updates(arity, 250, dom=6, seed=2):
        (dbs[s].add if ins else dbs[s].discard)(t)
        eng.apply(Update(s, t, ins))
    assert eng.full_result_set() == expected_result(bq.cq, dbs, bq.post_filter)


def test_enumeration_no_duplicates():
    bq = GRAPH_QUERIES["4hop_proj"]()
    eng = CrownEngine(bq.cq)
    for s, t, ins in random_updates({"G": 2}, 200, dom=5, seed=3):
        eng.apply(Update(s, t, ins))
    results = list(eng.enumerate_full())
    assert len(results) == len(set(results))


def test_enumeration_is_restartable():
    bq = GRAPH_QUERIES["3hop_proj"]()
    eng = CrownEngine(bq.cq)
    for s, t, ins in random_updates({"G": 2}, 150, dom=5, seed=4):
        eng.apply(Update(s, t, ins))
    assert set(eng.enumerate_full()) == set(eng.enumerate_full())


class TestLiveViews:
    @pytest.mark.parametrize("name", ["3hop_proj", "4hop_proj", "star"])
    def test_live_view_invariant(self, name):
        """V_l(R_e) = π_{e∩y} Q(D) after every update (Lemma 5.5)."""
        bq = GRAPH_QUERIES[name]()
        eng = CrownEngine(bq.cq, post_filter=bq.post_filter)
        dbs = {"G": set()}
        for step, (s, t, ins) in enumerate(random_updates({"G": 2}, 200, dom=4, seed=5)):
            (dbs[s].add if ins else dbs[s].discard)(t)
            eng.apply(Update(s, t, ins))
            if step % 10:
                continue
            q = expected_result(bq.cq, dbs)  # unfiltered: live views are
            for node in eng._live_nodes:
                expect = {
                    tuple(dict(zip(bq.cq.output, r))[a] for a in node.y_attrs)
                    for r in q
                }
                assert node.live == expect, f"{name} live({node.name}) step {step}"

    def test_rebuild_live_equals_incremental(self):
        bq = GRAPH_QUERIES["4hop_proj"]()
        eng = CrownEngine(bq.cq)
        for s, t, ins in random_updates({"G": 2}, 200, dom=4, seed=6):
            eng.apply(Update(s, t, ins))
        incr = {n.name: set(n.live) for n in eng._live_nodes}
        eng.rebuild_live()
        rebuilt = {n.name: set(n.live) for n in eng._live_nodes}
        assert incr == rebuilt


class TestNonFreeConnex:
    def test_distinct_consumer_over_extended_output(self):
        """§7.1: π_{x1,x3}(R1 ⋈ R2) is not free-connex; run the extended
        query (adding x2) and deduplicate with DistinctConsumer."""
        from repro.core.aggregates import DistinctConsumer

        inner = CQ(
            (Relation("R1", ("x1", "x2")), Relation("R2", ("x2", "x3"))),
            output=("x1", "x2", "x3"),
            name="ext",
        )
        eng = CrownEngine(inner)
        dc = DistinctConsumer(inner, keep=("x1", "x3"))
        dbs = {"R1": set(), "R2": set()}
        cur = set()
        for s, t, ins in random_updates({"R1": 2, "R2": 2}, 300, dom=4, seed=7):
            (dbs[s].add if ins else dbs[s].discard)(t)
            out = dc.feed(eng.apply(Update(s, t, ins)))
            new = {(a, c) for a, b, c in expected_result(inner, dbs)}
            assert {t2 for sg, t2 in out if sg > 0} == new - cur
            assert {t2 for sg, t2 in out if sg < 0} == cur - new
            cur = new
        assert dc.result() == cur
