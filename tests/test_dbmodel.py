"""LocalDB / schema model tests."""
import pandas as pd
import pytest

from repro.core.dbmodel import (
    Attribute as A,
    LocalDB,
    Relation,
    local_db_from_spark,
)


class TestRelation:
    def test_attr_index(self):
        r = Relation("r", (A("x", "dx"), A("y", "dy")))
        assert r.attr_index("y") == 1
        with pytest.raises(KeyError):
            r.attr_index("z")


class TestLocalDB:
    def _db(self):
        rels = {"r": Relation("r", (A("id", "d1"), A("v", "d2")))}
        return LocalDB(rels, {"r": [("a", 1), ("b", 2), ("a", 3)]})

    def test_index_lookup(self):
        db = self._db()
        assert db.lookup("r", 0, "a") == [0, 2]
        assert db.lookup("r", 1, 2) == [1]
        assert db.lookup("r", 0, "zz") == []

    def test_n_tuples(self):
        assert self._db().n_tuples() == 3

    def test_missing_relation_lookup(self):
        assert self._db().lookup("nope", 0, "a") == []


class TestFromSpark:
    def test_collects_native_types(self, spark):
        rels = {"r": Relation("r", (A("id", "d1"), A("n", "d2")))}
        df = spark.createDataFrame(pd.DataFrame({"id": ["a"], "n": [3]}))
        db = local_db_from_spark(rels, {"r": df})
        v = db.tuples["r"][0][1]
        assert type(v) is int  # not numpy.int64

    def test_pandas_accepted(self):
        rels = {"r": Relation("r", (A("id", "d1"),))}
        db = local_db_from_spark(rels, {"r": pd.DataFrame({"id": ["a", "b"]})})
        assert db.n_tuples() == 2

    def test_column_order_by_schema(self):
        rels = {"r": Relation("r", (A("b", "d1"), A("a", "d2")))}
        db = local_db_from_spark(rels, {"r": pd.DataFrame({"a": [1], "b": [2]})})
        assert db.tuples["r"][0] == (2, 1)

    def test_missing_column_raises(self):
        rels = {"r": Relation("r", (A("x", "d1"),))}
        with pytest.raises(ValueError, match="missing columns"):
            local_db_from_spark(rels, {"r": pd.DataFrame({"y": [1]})})

    def test_empty_frame(self):
        rels = {"r": Relation("r", (A("x", "d1"),))}
        db = local_db_from_spark(rels, {"r": pd.DataFrame({"x": []})})
        assert db.tuples["r"] == []
