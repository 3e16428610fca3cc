"""CQ/Relation substrate (§3.1)."""
import pytest

from repro.cq.query import CQ, Relation


def test_relation_attrs():
    r = Relation("R", ("a", "b"))
    assert r.attr_set == {"a", "b"}
    assert r.stream == "R"


def test_relation_custom_stream():
    r = Relation("G1", ("a", "b"), stream="G")
    assert r.stream == "G"


def test_relation_duplicate_attr_rejected():
    with pytest.raises(ValueError):
        Relation("R", ("a", "a"))


def test_cq_full_join_flag():
    cq = CQ((Relation("R", ("a", "b")),), output=("a", "b"))
    assert cq.is_full


def test_cq_join_project_flag():
    cq = CQ((Relation("R", ("a", "b")),), output=("a",))
    assert not cq.is_full


def test_cq_output_must_exist():
    with pytest.raises(ValueError):
        CQ((Relation("R", ("a",)),), output=("z",))


def test_cq_distinct_names_required():
    with pytest.raises(ValueError):
        CQ((Relation("R", ("a",)), Relation("R", ("b",))), output=("a",))


def test_atoms_of_stream_self_join():
    cq = CQ(
        (
            Relation("G1", ("a", "b"), stream="G"),
            Relation("G2", ("b", "c"), stream="G"),
            Relation("S", ("c",)),
        ),
        output=("a", "b", "c"),
    )
    assert [r.name for r in cq.atoms_of_stream("G")] == ["G1", "G2"]
    assert [r.name for r in cq.atoms_of_stream("S")] == ["S"]


def test_all_attrs_union():
    cq = CQ(
        (Relation("R", ("a", "b")), Relation("S", ("b", "c"))), output=("a",)
    )
    assert cq.all_attrs == {"a", "b", "c"}


def test_with_output():
    cq = CQ((Relation("R", ("a", "b")),), output=("a", "b"))
    cq2 = cq.with_output(("a",))
    assert cq2.output == ("a",) and cq.output == ("a", "b")


def test_hyperedges():
    cq = CQ(
        (Relation("R", ("a", "b")), Relation("S", ("b", "c"))), output=("a",)
    )
    assert cq.hyperedges() == [frozenset({"a", "b"}), frozenset({"b", "c"})]


def test_relation_lookup():
    cq = CQ((Relation("R", ("a",)),), output=("a",))
    assert cq.relation("R").attrs == ("a",)
    with pytest.raises(KeyError):
        cq.relation("X")
