"""Unit tests for repro.core.pattern (S1)."""
import numpy as np
import pytest

from repro.core.pattern import Pattern, Predicate, chain_predicates


def seq_pattern(n=3, window=10.0):
    types = tuple(f"T{i}" for i in range(n))
    return Pattern("SEQ", types, chain_predicates(types, "v", "<"), window)


class TestPredicate:
    @pytest.mark.parametrize("op", ["<", "<=", ">", ">="])
    def test_valid_ops(self, op):
        p = Predicate("A", "x", op, "B", "y")
        assert p.op == op

    def test_invalid_op(self):
        with pytest.raises(ValueError, match="operator"):
            Predicate("A", "x", "==", "B", "y")

    def test_same_type_rejected(self):
        with pytest.raises(ValueError, match="distinct"):
            Predicate("A", "x", "<", "A", "y")

    def test_pair_is_canonical(self):
        assert Predicate("B", "x", "<", "A", "x").pair == ("A", "B")
        assert Predicate("A", "x", "<", "B", "x").pair == ("A", "B")

    @pytest.mark.parametrize(
        "op,l,r,expect",
        [
            ("<", 1.0, 2.0, True),
            ("<", 2.0, 1.0, False),
            ("<=", 2.0, 2.0, True),
            (">", 3.0, 2.0, True),
            (">=", 2.0, 2.0, True),
            (">", 2.0, 3.0, False),
        ],
    )
    def test_numpy_mask_scalar(self, op, l, r, expect):
        p = Predicate("A", "x", op, "B", "x")
        assert bool(p.numpy_mask(np.array([l]), np.array([r]))[0]) is expect

    def test_numpy_mask_vectorised(self):
        p = Predicate("A", "x", "<", "B", "x")
        got = p.numpy_mask(np.array([1, 5, 3]), np.array([2, 4, 3]))
        assert got.tolist() == [True, False, False]

    def test_sql_rendering(self):
        p = Predicate("A", "cars", "<", "B", "cars")
        assert p.sql(lambda t: t.lower()) == "a.cars < b.cars"

    def test_spark_condition_builds_column(self, spark):
        # Needs the session fixture: pyspark 4 column construction
        # asserts an active session.
        p = Predicate("A", "x", ">=", "B", "y")
        col = p.spark_condition(lambda t, a: f"{t}_{a}")
        assert "A_x" in str(col) and "B_y" in str(col)


class TestPattern:
    def test_basic(self):
        pat = seq_pattern(3)
        assert pat.size == 3
        assert pat.position("T1") == 1

    def test_invalid_operator(self):
        with pytest.raises(ValueError, match="operator"):
            Pattern("OR", ("A", "B"), (), 1.0)

    def test_duplicate_types(self):
        with pytest.raises(ValueError, match="distinct"):
            Pattern("SEQ", ("A", "A"), (), 1.0)

    def test_nonpositive_window(self):
        with pytest.raises(ValueError, match="window"):
            Pattern("SEQ", ("A", "B"), (), 0.0)

    def test_unknown_predicate_type(self):
        with pytest.raises(ValueError, match="unknown type"):
            Pattern("SEQ", ("A", "B"), (Predicate("A", "x", "<", "C", "x"),), 1.0)

    def test_predicates_between_is_symmetric(self):
        pat = seq_pattern(3)
        assert pat.predicates_between("T0", "T1") == pat.predicates_between("T1", "T0")
        assert len(pat.predicates_between("T0", "T1")) == 1
        assert pat.predicates_between("T0", "T2") == ()

    def test_predicate_pairs_distinct(self):
        types = ("A", "B")
        preds = (
            Predicate("A", "x", "<", "B", "x"),
            Predicate("A", "y", ">", "B", "y"),
        )
        pat = Pattern("SEQ", types, preds, 1.0)
        assert pat.predicate_pairs() == (("A", "B"),)

    @pytest.mark.parametrize("n", [2, 3, 4, 5])
    def test_subpattern_prefix(self, n):
        pat = seq_pattern(6)
        sub = pat.subpattern(n)
        assert sub.event_types == pat.event_types[:n]
        assert len(sub.predicates) == n - 1
        assert sub.window == pat.window

    def test_subpattern_drops_out_of_scope_predicates(self):
        pat = seq_pattern(5)
        sub = pat.subpattern(2)
        assert all(
            p.left_type in sub.event_types and p.right_type in sub.event_types
            for p in sub.predicates
        )

    def test_and_pattern_allowed(self):
        pat = Pattern("AND", ("A", "B", "C"), (), 5.0)
        assert pat.operator == "AND"


class TestChainPredicates:
    @pytest.mark.parametrize("n", [2, 3, 8])
    def test_length(self, n):
        types = [f"X{i}" for i in range(n)]
        assert len(chain_predicates(types, "v", "<")) == n - 1

    def test_consecutive_pairs(self):
        preds = chain_predicates(("A", "B", "C"), "v", ">")
        assert [(p.left_type, p.right_type) for p in preds] == [("A", "B"), ("B", "C")]
        assert all(p.op == ">" for p in preds)
