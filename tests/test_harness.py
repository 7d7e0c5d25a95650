"""Bench-harness tests (repro.bench.harness): cell runner, table
assembly, #results cross-implementation assertion, formatting."""
import pytest

from repro.bench.harness import (
    COLUMNS,
    DENSE_SKIP,
    TableRow,
    format_comparison,
    format_table,
    run_cell,
    run_table,
)
from repro.bench.paper_numbers import PAPER_TABLE1, PAPER_TABLE2
from repro.cfg.cnf import to_cnf
from repro.cfg.queries import query1, query2
from repro.graphs.ontology import GRAPH_NAMES, query_graph


class TestRunCell:
    def test_returns_count_and_time(self):
        g = query_graph("skos")
        count, ms = run_cell(g, to_cnf(query2()), "sCPU")
        assert count == 1 and ms > 0

    def test_paper_names_and_engine_names_agree(self):
        g = query_graph("skos")
        grammar = to_cnf(query2())
        c1, _ = run_cell(g, grammar, "sCPU")
        c2, _ = run_cell(g, grammar, "csr")
        assert c1 == c2

    def test_spark_cell(self, spark):
        g = query_graph("skos")
        count, ms = run_cell(g, to_cnf(query2()), "sGPU", spark=spark)
        assert count == 1 and ms > 0


class TestRunTable:
    def test_small_table_counts_consistent(self, spark):
        rows = run_table(
            query2(),
            spark=spark,
            graph_names=("skos", "travel"),
            columns=("GLL", "sCPU"),
        )
        assert [r.name for r in rows] == ["skos", "travel"]
        assert rows[0].n_results == 1
        assert all(set(r.times_ms) == {"GLL", "sCPU"} for r in rows)

    def test_dense_skipped_on_synthetic(self, spark, monkeypatch):
        # dGPU cell must be absent for g1-g3, as in the paper's tables
        assert DENSE_SKIP == {"g1", "g2", "g3"}

    def test_mismatched_counts_raise(self, spark, monkeypatch):
        import repro.bench.harness as h

        real = h.run_cell

        def bad(graph, grammar, impl, **kw):
            count, ms = real(graph, grammar, impl, **kw)
            return (count + 1 if impl == "sCPU" else count), ms

        monkeypatch.setattr(h, "run_cell", bad)
        with pytest.raises(AssertionError, match="results"):
            h.run_table(
                query2(),
                spark=spark,
                graph_names=("skos",),
                columns=("GLL", "sCPU"),
            )


class TestFormatting:
    ROWS = [
        TableRow("skos", 252, 810, {"GLL": 10.0, "sCPU": 14.0}),
        TableRow("g1", 8688, 141072, {"GLL": 1926.0}),
    ]

    def test_format_table_layout(self):
        out = format_table(self.ROWS, title="Table 1", columns=("GLL", "dGPU", "sCPU"))
        lines = out.splitlines()
        assert lines[0] == "Table 1"
        assert lines[1].split("\t")[:3] == ["Ontology", "#triples", "#results"]
        assert "-" in lines[3].split("\t"), "missing dGPU cell rendered as -"

    def test_format_comparison_markdown(self):
        out = format_comparison(
            self.ROWS, PAPER_TABLE1, title="Table 1", columns=("GLL", "dGPU", "sCPU")
        )
        assert "### Table 1" in out
        assert "810 / 810" in out
        assert "| skos |" in out


class TestPaperNumbers:
    def test_all_graphs_present(self):
        assert set(PAPER_TABLE1) == set(PAPER_TABLE2) == set(GRAPH_NAMES)

    def test_dgpu_omitted_on_large(self):
        for g in ("g1", "g2", "g3"):
            assert PAPER_TABLE1[g][3] is None
            assert PAPER_TABLE2[g][3] is None

    def test_columns(self):
        assert COLUMNS == ("GLL", "dGPU", "sCPU", "sGPU")

    def test_triples_column_consistent_between_tables(self):
        for name in PAPER_TABLE1:
            assert PAPER_TABLE1[name][0] == PAPER_TABLE2[name][0]
