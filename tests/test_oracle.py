"""The DuckDB oracle must actually catch wrong results, and the recursive
CTE references must agree with the brute-force Python enumerator."""
import duckdb
import pandas as pd
import pytest

from repro.graph.duck_oracle import arrival_sql, departure_sql, tspg_sql
from repro.graph.generators import random_small_graph
from repro.graph.schema import edges_to_pdf, edges_to_spark, pdf_to_edge_list
from repro.oracle import assert_equivalent

from tests.example_graph import EDGES, EXPECTED_TSPG, S, T, TB, TE
from tests.reference import brute_arrival, brute_departure, brute_tspg


def _run_duck(sql: str, edges_pdf: pd.DataFrame) -> pd.DataFrame:
    con = duckdb.connect()
    try:
        con.register("edges", edges_pdf)
        return con.execute(sql).fetchdf()
    finally:
        con.close()


class TestRecursiveCTEReferences:
    def test_tspg_sql_on_example(self):
        got = _run_duck(tspg_sql(S, T, TB, TE), edges_to_pdf(EDGES))
        rows = sorted(map(tuple, got[["src", "dst", "ts"]].values.tolist()))
        assert rows == EXPECTED_TSPG

    @pytest.mark.parametrize("seed", range(8))
    def test_tspg_sql_vs_brute(self, seed):
        pdf = random_small_graph(n=7, m=18, n_ts=6, seed=seed + 40)
        edges = pdf_to_edge_list(pdf)
        if not edges:
            pytest.skip("empty")
        got = _run_duck(tspg_sql(0, 5, 1, 6), pdf)
        rows = sorted(map(tuple, got[["src", "dst", "ts"]].values.tolist()))
        assert rows == brute_tspg(edges, 0, 5, 1, 6)

    @pytest.mark.parametrize("seed", range(8))
    def test_polarity_sql_vs_brute(self, seed):
        pdf = random_small_graph(n=7, m=18, n_ts=6, seed=seed + 80)
        edges = pdf_to_edge_list(pdf)
        if not edges:
            pytest.skip("empty")
        got = _run_duck(arrival_sql(0, 5, 1, 6), pdf)
        a = dict(zip(got["v"].astype(int), got["arrival"].astype(int)))
        assert a == brute_arrival(edges, 0, 5, 1, 6)
        got = _run_duck(departure_sql(0, 5, 1, 6), pdf)
        d = dict(zip(got["v"].astype(int), got["departure"].astype(int)))
        assert d == brute_departure(edges, 0, 5, 1, 6)


class TestAssertEquivalent:
    def test_passes_on_correct_result(self, spark):
        pdf = edges_to_pdf(EDGES)
        df = edges_to_spark(spark, pdf).where(f"ts between {TB} and {TE}")
        assert_equivalent(
            df,
            f"SELECT src, dst, ts FROM edges WHERE ts BETWEEN {TB} AND {TE}",
            edges=pdf,
        )

    def test_fails_on_wrong_rows(self, spark):
        pdf = edges_to_pdf(EDGES)
        df = edges_to_spark(spark, pdf).where(f"ts between {TB} and {TE - 1}")
        with pytest.raises(AssertionError):
            assert_equivalent(
                df,
                f"SELECT src, dst, ts FROM edges WHERE ts BETWEEN {TB} AND {TE}",
                edges=pdf,
            )

    def test_fails_on_column_mismatch(self, spark):
        pdf = edges_to_pdf(EDGES)
        df = edges_to_spark(spark, pdf).selectExpr("src AS a", "dst", "ts")
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                df, "SELECT src, dst, ts FROM edges", edges=pdf
            )
