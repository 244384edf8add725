"""Unit tests for the query / hypergraph model."""
import duckdb
import pandas as pd
import pytest

from repro.core.query import (
    ALL_QUERIES,
    JoinQuery,
    Relation,
    get_query,
    q1,
    q2,
    q3,
    q4,
    q5,
    q6,
)


class TestRelation:
    def test_attrs_preserved(self):
        r = Relation("R1", ("a", "b"))
        assert r.attrs == ("a", "b")
        assert r.attr_set == frozenset({"a", "b"})

    def test_duplicate_attr_rejected(self):
        with pytest.raises(ValueError):
            Relation("R1", ("a", "a"))

    def test_empty_attrs_rejected(self):
        with pytest.raises(ValueError):
            Relation("R1", ())


class TestJoinQuery:
    def test_attrs_union_in_first_appearance_order(self):
        q = q2()
        assert q.attrs == ("a", "b", "c", "d")

    def test_duplicate_relation_names_rejected(self):
        with pytest.raises(ValueError):
            JoinQuery("bad", [Relation("R", ("a", "b")), Relation("R", ("b", "c"))])

    def test_relations_with(self):
        q = q1()
        assert [r.name for r in q.relations_with("a")] == ["R1", "R3"]
        assert [r.name for r in q.relations_with("b")] == ["R1", "R2"]

    def test_hyperedges(self):
        assert q1().hyperedges == [
            frozenset({"a", "b"}),
            frozenset({"b", "c"}),
            frozenset({"a", "c"}),
        ]

    def test_connected(self):
        assert q1().is_connected()
        dis = JoinQuery(
            "dis", [Relation("R1", ("a", "b")), Relation("R2", ("c", "d"))]
        )
        assert not dis.is_connected()

    @pytest.mark.parametrize("name", sorted(ALL_QUERIES))
    def test_all_paper_queries_connected(self, name):
        assert get_query(name).is_connected()

    def test_query_shapes_match_paper(self):
        assert len(q1().relations) == 3
        assert len(q2().relations) == 5
        assert len(q3().relations) == 10
        assert len(q4().relations) == 6
        assert len(q5().relations) == 7
        assert len(q6().relations) == 8
        # Q3 is the 5-clique: every pair of attrs covered
        edges = {frozenset(r.attrs) for r in q3().relations}
        attrs = q3().attrs
        assert len(attrs) == 5
        assert edges == {
            frozenset({x, y}) for x in attrs for y in attrs if x < y
        }

    def test_unknown_query(self):
        with pytest.raises(KeyError):
            get_query("Q99")


class TestToSql:
    def _run(self, sql: str, edges: pd.DataFrame) -> pd.DataFrame:
        con = duckdb.connect()
        try:
            con.register("e", edges)
            return con.execute(sql).fetchdf()
        finally:
            con.close()

    def test_triangle_sql_counts(self):
        # Q1 needs edges a->b, b->c, a->c: the transitive triple 1,2,3
        # is the only match in this graph
        edges = pd.DataFrame({"src": [1, 2, 1, 3], "dst": [2, 3, 3, 1]})
        out = self._run(q1().to_sql(), edges)
        assert out.values.tolist() == [[1, 2, 3]]
        assert list(out.columns) == ["a", "b", "c"]

    def test_path_sql(self):
        edges = pd.DataFrame({"src": [1, 2], "dst": [2, 3]})
        out = self._run(get_query("Q7").to_sql(), edges)
        assert out.sort_values(["a"]).values.tolist() == [[1, 2, 3]]

    def test_sql_mentions_every_relation(self):
        sql = q6().to_sql()
        for i in range(8):
            assert f"e r{i}" in sql

    def test_custom_table_mapping(self):
        q = JoinQuery("t", [Relation("R1", ("x", "y"))])
        sql = q.to_sql(tables={"R1": ("edges", ("u", "v"))})
        assert sql == "SELECT r0.u AS x, r0.v AS y FROM edges r0"

    def test_arity_mismatch_rejected(self):
        q = JoinQuery("t", [Relation("R1", ("x", "y", "z"))])
        with pytest.raises(ValueError):
            q.to_sql(tables={"R1": ("edges", ("u", "v"))})
