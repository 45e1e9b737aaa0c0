"""Unit tests for the hypothesis data model (paper §2.2 formalism)."""
import pytest

from repro.core.hypothesis import (
    Agg,
    AttrRef,
    Hypothesis,
    Modifier,
    Op,
    PathStep,
    Predicate,
    path_hypothesis,
)


class TestPredicate:
    def test_categorical_eval(self):
        p = Predicate("genre", "==", "Comedy")
        assert p.eval({"genre": "Comedy"})
        assert not p.eval({"genre": "Action"})

    def test_missing_attr_is_false(self):
        assert not Predicate("x", "==", "1").eval({})

    @pytest.mark.parametrize(
        "op,val,attrs,expected",
        [
            (">", 10, {"age": "20"}, True),
            (">", 10, {"age": "5"}, False),
            (">=", 10, {"age": "10"}, True),
            ("<", 10, {"age": "5"}, True),
            ("<=", 10, {"age": "10"}, True),
            ("!=", 10, {"age": "11"}, True),
            ("==", 10, {"age": "10"}, True),
        ],
    )
    def test_numeric_ops(self, op, val, attrs, expected):
        assert Predicate("age", op, val, numeric=True).eval(attrs) is expected

    def test_numeric_string_coercion(self):
        # Attribute values are stored as strings in the map; numeric
        # predicates must cast.
        assert Predicate("year", "==", 2005, numeric=True).eval({"year": "2005"})

    def test_bad_op_raises_in_column(self):
        from pyspark.sql import functions as F

        with pytest.raises(ValueError):
            Predicate("x", "~", 1).to_column(F.col("attrs"))


class TestOp:
    @pytest.mark.parametrize(
        "op,v,c,expected",
        [
            (Op.GT, 2.0, 1.0, True),
            (Op.GT, 1.0, 1.0, False),
            (Op.LT, 0.5, 1.0, True),
            (Op.EQ, 1.0, 1.0, True),
            (Op.NE, 2.0, 1.0, True),
            (Op.NE, 1.0, 1.0, False),
        ],
    )
    def test_apply(self, op, v, c, expected):
        assert op.apply(v, c) is expected

    def test_alternatives(self):
        assert Op.GT.alternative == "greater"
        assert Op.LT.alternative == "less"
        assert Op.EQ.alternative == "two-sided"
        assert Op.NE.alternative == "two-sided"


def _mk(l: int) -> Hypothesis:
    mods = [Modifier("t")] * (l + 1)
    return path_hypothesis(
        f"h{l}", mods, ["r"] * l, AttrRef("node", 0, "a"), Agg.AVG, Op.GT, 0.0
    )


class TestHypothesis:
    def test_kind_by_length(self):
        # l=0 -> node, l=1 -> edge, l>=2 -> path (paper §2.2).
        assert _mk(0).kind == "node"
        assert _mk(1).kind == "edge"
        assert _mk(2).kind == "path"
        assert _mk(4).kind == "path"

    def test_length(self):
        assert _mk(3).length == 3

    def test_modifiers_in_path_order(self):
        m0, m1 = Modifier("a"), Modifier("b", (Predicate("k", "==", "v"),))
        h = path_hypothesis(
            "h", [m0, m1], ["r"], AttrRef("edge", 0, "w"), Agg.AVG, Op.GT, 0
        )
        assert h.modifiers == (m0, m1)

    def test_constructor_arity_check(self):
        with pytest.raises(ValueError):
            path_hypothesis(
                "bad", [Modifier("a")], ["r"], AttrRef("node", 0, "x"),
                Agg.AVG, Op.GT, 0,
            )

    def test_decide(self):
        h = _mk(0)
        assert h.decide(1.0) is True
        assert h.decide(-1.0) is False
        assert h.decide(None) is None  # undecided: no relevant instances

    def test_steps_are_pathsteps(self):
        h = _mk(2)
        assert all(isinstance(s, PathStep) for s in h.steps)

    def test_frozen(self):
        h = _mk(0)
        with pytest.raises(AttributeError):
            h.c = 5.0


class TestBankStructure:
    """The hypothesis bank mirrors the paper's experimental design."""

    @pytest.mark.parametrize("ds", ["MovieLens", "DBLP", "Yelp"])
    def test_three_per_type(self, ds):
        from repro.datasets.bank import bank

        b = bank(ds)
        assert set(b) == {"node", "edge", "path"}
        for htype, hyps in b.items():
            assert len(hyps) == 3
            for h in hyps:
                assert h.kind == htype

    @pytest.mark.parametrize("ds,prefix", [("MovieLens", "ML"), ("DBLP", "DB"), ("Yelp", "YP")])
    def test_naming_convention(self, ds, prefix):
        from repro.datasets.bank import bank

        for hyps in bank(ds).values():
            for h in hyps:
                assert h.name.startswith(prefix + "-")

    def test_long_paths(self):
        from repro.datasets.bank import dblp_long_paths

        lp = dblp_long_paths()
        assert lp[3].length == 3
        assert lp[4].length == 4
        assert all(h.kind == "path" for h in lp.values())
