"""Property-based tests (hypothesis): delta exactness under arbitrary
event sequences, and cross-engine agreement."""
from collections import Counter

from hypothesis import given, settings, strategies as st

from repro.bench.queries import hop3_proj
from repro.core.baseline_cp import StandardCPEngine
from repro.core.engine import CrownEngine
from repro.core.naive import evaluate
from repro.streams.sequences import Update

edge = st.tuples(st.integers(0, 3), st.integers(0, 3))
event = st.tuples(edge, st.booleans())


@settings(max_examples=40, deadline=None)
@given(st.lists(event, max_size=60))
def test_crown_deltas_exact_on_any_sequence(events):
    bq = hop3_proj()
    eng = CrownEngine(bq.cq)
    db: set = set()
    cur: set = set()
    for t, ins in events:
        if ins:
            db.add(t)
        else:
            db.discard(t)
        deltas = eng.apply(Update("G", t, ins))
        new = evaluate(bq.cq, {r.name: set(db) for r in bq.cq.relations})
        assert {x for s, x in deltas if s > 0} == new - cur
        assert {x for s, x in deltas if s < 0} == cur - new
        cur = new
    assert eng.full_result_set() == cur


@settings(max_examples=25, deadline=None)
@given(st.lists(event, max_size=50))
def test_crown_and_cp_agree(events):
    bq = hop3_proj()
    crown = CrownEngine(bq.cq)
    cp = StandardCPEngine(bq.cq)
    for t, ins in events:
        a = Counter(crown.apply(Update("G", t, ins)))
        b = Counter(cp.apply(Update("G", t, ins)))
        assert a == b


@settings(max_examples=25, deadline=None)
@given(st.lists(edge, unique=True, max_size=40), st.randoms())
def test_insert_then_shuffled_delete_telescopes(edges, rnd):
    bq = hop3_proj()
    eng = CrownEngine(bq.cq)
    net: Counter = Counter()
    for t in edges:
        for s, x in eng.apply(Update("G", t, True)):
            net[x] += s
    order = list(edges)
    rnd.shuffle(order)
    for t in order:
        for s, x in eng.apply(Update("G", t, False)):
            net[x] += s
    assert eng.full_result_set() == set()
    assert all(c == 0 for c in net.values())
