"""Unit tests for the predicate model (Definition 2)."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from repro.core.predicates import Cmp, Conjunction, In, NotNull


@pytest.fixture()
def pdf() -> pd.DataFrame:
    return pd.DataFrame(
        {
            "etype": ["song", "artist", "person", None, "song", "city"],
            "height": [np.nan, 1.7, 1.8, np.nan, np.nan, np.nan],
            "pop": [10.0, 20.0, 30.0, 40.0, 50.0, np.nan],
            "rank": [1, 2, 3, 4, 5, 6],
        }
    )


class TestCmp:
    @pytest.mark.parametrize(
        "op,value,expected",
        [
            ("<", 30.0, [True, True, False, False, False, False]),
            ("<=", 30.0, [True, True, True, False, False, False]),
            (">", 30.0, [False, False, False, True, True, False]),
            (">=", 30.0, [False, False, True, True, True, False]),
            ("=", 30.0, [False, False, True, False, False, False]),
        ],
    )
    def test_ops(self, pdf, op, value, expected):
        assert Cmp("pop", op, value).mask(pdf).tolist() == expected

    def test_null_never_matches(self, pdf):
        # NaN in "pop" row 5 must be excluded for every operator.
        for op in ["<", "<=", ">", ">=", "="]:
            assert not Cmp("pop", op, 1e18).mask(pdf)[5] or op in ("<", "<=")
        assert not Cmp("pop", ">", -1e18).mask(pdf)[5]

    def test_string_equality(self, pdf):
        assert Cmp("etype", "=", "song").mask(pdf).tolist() == [
            True, False, False, False, True, False,
        ]

    def test_bad_op_rejected(self):
        with pytest.raises(ValueError):
            Cmp("pop", "!=", 1)

    def test_sql_rendering(self):
        assert Cmp("pop", "<", 3).to_sql() == "(pop < 3)"
        assert Cmp("etype", "=", "so'ng").to_sql() == "(etype = 'so''ng')"

    def test_hash_equality(self):
        assert Cmp("a", "<", 1) == Cmp("a", "<", 1)
        assert hash(Cmp("a", "<", 1)) == hash(Cmp("a", "<", 1))
        assert Cmp("a", "<", 1) != Cmp("a", "<=", 1)


class TestIn:
    def test_membership(self, pdf):
        assert In("etype", ["song", "city"]).mask(pdf).tolist() == [
            True, False, False, False, True, True,
        ]

    def test_null_never_matches(self, pdf):
        assert not In("etype", ["song"]).mask(pdf)[3]

    def test_empty_rejected(self):
        with pytest.raises(ValueError):
            In("etype", [])

    def test_sql_sorted_deterministic(self):
        assert In("etype", ["b", "a"]).to_sql() == "(etype IN ('a', 'b'))"

    def test_hash_order_insensitive(self):
        assert In("x", [1, 2]) == In("x", [2, 1])
        assert hash(In("x", [1, 2])) == hash(In("x", [2, 1]))

    def test_int_membership(self, pdf):
        assert In("rank", [2, 4, 6]).mask(pdf).tolist() == [
            False, True, False, True, False, True,
        ]


class TestNotNull:
    def test_float_column(self, pdf):
        assert NotNull("height").mask(pdf).tolist() == [
            False, True, True, False, False, False,
        ]

    def test_object_column(self, pdf):
        assert NotNull("etype").mask(pdf).tolist() == [
            True, True, True, False, True, True,
        ]

    def test_sql(self):
        assert NotNull("h").to_sql() == "(h IS NOT NULL)"


class TestConjunction:
    def test_empty_is_true(self, pdf):
        assert Conjunction().mask(pdf).all()
        assert Conjunction().to_sql() == "TRUE"

    def test_and_semantics(self, pdf):
        c = Conjunction([Cmp("etype", "=", "person"), NotNull("height")])
        assert c.mask(pdf).tolist() == [False, False, True, False, False, False]

    def test_attrs_union(self):
        c = Conjunction([Cmp("a", "<", 1), NotNull("b"), In("a", [1])])
        assert c.attrs() == frozenset({"a", "b"})

    def test_iteration_and_len(self):
        preds = [Cmp("a", "<", 1), NotNull("b")]
        c = Conjunction(preds)
        assert len(c) == 2 and list(c) == preds

    def test_hashable_for_grouping(self):
        a = Conjunction([Cmp("a", "<", 1)])
        b = Conjunction([Cmp("a", "<", 1)])
        assert a == b and hash(a) == hash(b)


@pytest.mark.parametrize(
    "pred",
    [
        Cmp("pop", "<", 25.0),
        Cmp("pop", ">=", 30.0),
        Cmp("etype", "=", "song"),
        In("etype", ["song", "artist"]),
        In("rank", [1, 3, 5]),
        NotNull("height"),
        NotNull("etype"),
        Conjunction([Cmp("etype", "=", "person"), NotNull("height")]),
        Conjunction([In("etype", ["song", "city"]), Cmp("pop", ">", 5.0)]),
        Conjunction(),
    ],
)
def test_sql_matches_pandas_mask_on_duckdb(pdf, pred):
    """to_sql() and mask() must agree — DuckDB evaluates the SQL over the
    same frame and the selected id sets are compared."""
    pdf = pdf.assign(_rid=np.arange(len(pdf)))
    con = duckdb.connect()
    try:
        con.register("t", pdf)
        got = con.execute(
            f"SELECT _rid FROM t WHERE {pred.to_sql()} ORDER BY _rid"
        ).fetchdf()["_rid"]
    finally:
        con.close()
    expected = pdf["_rid"][pred.mask(pdf)]
    assert got.tolist() == expected.tolist()
