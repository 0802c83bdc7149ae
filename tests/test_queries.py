"""Tests for the query model, SQL rendering and workload generation."""
import numpy as np
import pandas as pd
import duckdb
import pytest

from repro.queries import (
    Cond,
    Group,
    Query,
    WorkloadSpec,
    generate_workload,
    node_columns,
    node_conds,
    query_sql,
    sql_predicate,
)


class TestSqlRendering:
    def test_simple_count(self):
        q = Query("COUNT", "a", Cond("b", "<", 5))
        assert query_sql(q) == "SELECT count(a) AS val FROM t WHERE b < 5"

    def test_neq_rendered_as_sql(self):
        q = Query("AVG", "a", Cond("b", "!=", 2))
        assert "b <> 2" in query_sql(q)

    def test_string_literal_quoted(self):
        q = Query("COUNT", "a", Cond("c", "=", "x'y"))
        assert "'x''y'" in query_sql(q)

    def test_var_uses_var_pop(self):
        assert "var_pop" in query_sql(Query("VAR", "a"))

    def test_median(self):
        assert "median" in query_sql(Query("MEDIAN", "a"))

    def test_group_by(self):
        q = Query("SUM", "a", Cond("b", ">", 1), group_by="g")
        sql = query_sql(q)
        assert "GROUP BY g" in sql and "g AS grp" in sql

    def test_nested_precedence(self):
        node = Group("or", (Cond("a", "<", 1), Group("and", (Cond("b", ">", 2), Cond("c", "=", 3)))))
        s = sql_predicate(node)
        assert s == "(a < 1 OR (b > 2 AND c = 3))"

    def test_sql_runs_on_duckdb(self):
        pdf = pd.DataFrame({"a": [1.0, 2.0, 3.0], "b": [1.0, 2.0, 3.0]})
        con = duckdb.connect()
        con.register("t", pdf)
        for func in ("COUNT", "SUM", "AVG", "MIN", "MAX", "MEDIAN", "VAR"):
            q = Query(func, "a", Cond("b", ">=", 2.0))
            val = con.execute(query_sql(q)).fetchone()[0]
            assert val is not None


class TestNodeHelpers:
    def test_node_columns(self):
        node = Group("and", (Cond("a", "<", 1), Group("or", (Cond("b", "=", 2), Cond("a", ">", 0)))))
        assert node_columns(node) == {"a", "b"}
        assert node_columns(None) == set()

    def test_node_conds(self):
        node = Group("and", (Cond("a", "<", 1), Cond("b", "=", 2)))
        assert len(node_conds(node)) == 2

    def test_group_validation(self):
        with pytest.raises(AssertionError):
            Group("xor", (Cond("a", "<", 1),))


class TestWorkloadGeneration:
    @pytest.fixture(scope="class")
    def pdf(self):
        rng = np.random.default_rng(0)
        n = 5000
        return pd.DataFrame(
            {
                "x": rng.integers(0, 100, n).astype(float),
                "y": np.round(rng.normal(50, 10, n)),
                "cat": rng.choice(["u", "v", "w"], n, p=[0.6, 0.3, 0.1]),
            }
        )

    def test_generates_requested_count(self, pdf):
        spec = WorkloadSpec(n_queries=25, seed=1, min_selectivity=1e-3)
        qs = generate_workload(pdf, ["x", "y"], ["x", "y", "cat"], ["cat"], spec)
        assert len(qs) == 25

    def test_min_selectivity_respected(self, pdf):
        spec = WorkloadSpec(n_queries=15, seed=2, min_selectivity=0.05)
        qs = generate_workload(pdf, ["x", "y"], ["x", "y", "cat"], ["cat"], spec)
        con = duckdb.connect()
        con.register("t", pdf)
        for q in qs:
            sel = con.execute(
                f'SELECT count("{q.col}") FROM t WHERE {sql_predicate(q.where)}'
            ).fetchone()[0]
            assert sel >= 0.05 * len(pdf)

    def test_funcs_restricted(self, pdf):
        spec = WorkloadSpec(n_queries=20, funcs=("COUNT",), seed=3, min_selectivity=1e-3)
        qs = generate_workload(pdf, ["x", "y"], ["x", "y"], [], spec)
        assert all(q.func == "COUNT" for q in qs)

    def test_max_preds(self, pdf):
        spec = WorkloadSpec(n_queries=20, max_preds=2, seed=4, min_selectivity=1e-3)
        qs = generate_workload(pdf, ["x", "y"], ["x", "y", "cat"], ["cat"], spec)
        assert all(len(node_conds(q.where)) <= 2 for q in qs)

    def test_cat_predicates_equality_only(self, pdf):
        spec = WorkloadSpec(n_queries=30, seed=5, min_selectivity=1e-3)
        qs = generate_workload(pdf, ["x"], ["cat"], ["cat"], spec)
        for q in qs:
            for c in node_conds(q.where):
                assert c.op in ("=", "!=")

    def test_deterministic_in_seed(self, pdf):
        spec = WorkloadSpec(n_queries=10, seed=9, min_selectivity=1e-3)
        a = generate_workload(pdf, ["x", "y"], ["x", "y"], [], spec)
        b = generate_workload(pdf, ["x", "y"], ["x", "y"], [], spec)
        assert a == b
