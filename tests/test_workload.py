"""Tests for the multiple-RPQ workload generator (repro.workload)."""
import pytest

from repro.rpq.dnf import decompose_clause, to_dnf
from repro.rpq.parser import parse
from repro.workload import RPQSet, make_rpq_sets

LABELS = ["a", "b", "c", "d"]


class TestMakeRPQSets:
    def test_count(self):
        sets = make_rpq_sets(LABELS, sets_per_length=2, r_lengths=(1, 2, 3))
        assert len(sets) == 6

    def test_deterministic(self):
        s1 = make_rpq_sets(LABELS, seed=3)
        s2 = make_rpq_sets(LABELS, seed=3)
        assert s1 == s2

    def test_seed_varies(self):
        assert make_rpq_sets(LABELS, seed=3) != make_rpq_sets(LABELS, seed=4)

    def test_r_lengths(self):
        sets = make_rpq_sets(LABELS, sets_per_length=2, r_lengths=(1, 2, 3))
        lengths = [len(s.r_text.split(".")) for s in sets]
        assert lengths == [1, 1, 2, 2, 3, 3]

    def test_queries_are_batch_units(self):
        for s in make_rpq_sets(LABELS, sets_per_length=1):
            for q in s.queries:
                clauses = to_dnf(parse(q))
                assert len(clauses) == 1
                bu = decompose_clause(clauses[0])
                assert bu.kind == "+"
                assert bu.r.canon() == parse(s.r_text).canon()
                # Pre and Post are single labels (Section V-A).
                assert bu.pre.canon() in LABELS
                assert bu.post.canon() in LABELS

    def test_queries_share_common_r(self):
        for s in make_rpq_sets(LABELS, sets_per_length=1):
            rs = {
                decompose_clause(to_dnf(parse(q))[0]).r.canon()
                for q in s.queries
            }
            assert len(rs) == 1

    def test_max_rpqs(self):
        sets = make_rpq_sets(LABELS, max_rpqs_per_set=10)
        assert all(len(s.queries) == 10 for s in sets)

    def test_empty_labels_raises(self):
        with pytest.raises(ValueError):
            make_rpq_sets([])


class TestSubset:
    def test_nesting(self):
        s = make_rpq_sets(LABELS, sets_per_length=1)[0]
        assert s.subset(2) == s.subset(4)[:2]  # larger contains smaller

    def test_too_large_raises(self):
        s = RPQSet(r_text="a", queries=("a.(a)+.b",))
        with pytest.raises(ValueError):
            s.subset(2)
