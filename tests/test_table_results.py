"""Integration: the #results column of both evaluation tables.

Pins the exact result counts of the synthetic dataset substitute for
every graph (regression guard for the generator + engines), checks the
paper's structural invariants (g1/g2/g3 = 8x their base ontology — the
paper's own #results obey exactly this, validating the disjoint-copy
construction), and verifies engine-independence of the counts.
"""
import pytest

from repro.cfg.cnf import to_cnf
from repro.cfg.queries import query1, query2
from repro.core.api import graph_parse
from repro.graphs.ontology import query_graph

#: (query1 #results, query2 #results) of the synthetic substitute.
EXPECTED = {
    "skos": (717, 1),
    "generations": (2026, 0),
    "travel": (2066, 54),
    "univ-bench": (2132, 71),
    "atom-primitive": (15488, 106),
    "biomedical-measure-primitive": (17428, 1476),
    "foaf": (4137, 9),
    "people-pets": (7125, 40),
    "funding": (14291, 1386),
    "wine": (57053, 133),
    "pizza": (54935, 1056),
    "g1": (114328, 11088),
    "g2": (456424, 1064),
    "g3": (439480, 8448),
}


@pytest.fixture(scope="module")
def grammars():
    return to_cnf(query1()), to_cnf(query2())


@pytest.mark.parametrize("name", sorted(EXPECTED))
class TestResultCounts:
    def test_query1_count(self, name, grammars):
        q1, _ = grammars
        got = len(graph_parse(query_graph(name), q1, engine="csr")["S"])
        assert got == EXPECTED[name][0]

    def test_query2_count(self, name, grammars):
        _, q2 = grammars
        got = len(graph_parse(query_graph(name), q2, engine="csr")["S"])
        assert got == EXPECTED[name][1]


class TestRepetitionInvariant:
    """The paper's g1/g2/g3 #results are exactly 8x funding/wine/pizza
    (141072 = 8*17634, 532576 = 8*66572, 449560 = 8*56195, and the same
    for Table 2) — the same invariant must hold here by construction."""

    @pytest.mark.parametrize(
        "g,base", [("g1", "funding"), ("g2", "wine"), ("g3", "pizza")]
    )
    def test_eightfold(self, g, base):
        assert EXPECTED[g][0] == 8 * EXPECTED[base][0]
        assert EXPECTED[g][1] == 8 * EXPECTED[base][1]

    def test_paper_obeys_the_same_invariant(self):
        from repro.bench.paper_numbers import PAPER_TABLE1, PAPER_TABLE2

        for g, base in [("g1", "funding"), ("g2", "wine"), ("g3", "pizza")]:
            assert PAPER_TABLE1[g][1] == 8 * PAPER_TABLE1[base][1]
            assert PAPER_TABLE2[g][1] == 8 * PAPER_TABLE2[base][1]


class TestEngineIndependence:
    """The paper: "All implementations ... have the same #results"."""

    @pytest.mark.parametrize("name", ["skos", "univ-bench", "people-pets"])
    def test_local_engines_agree_query1(self, name, grammars):
        q1, _ = grammars
        g = query_graph(name)
        counts = {
            e: len(graph_parse(g, q1, engine=e)["S"])
            for e in ("hellings", "dense", "csr")
        }
        assert len(set(counts.values())) == 1, counts

    @pytest.mark.parametrize("name", ["skos", "travel"])
    def test_spark_agrees_query2(self, spark, name, grammars):
        _, q2 = grammars
        g = query_graph(name)
        local = len(graph_parse(g, q2, engine="csr")["S"])
        dist = len(graph_parse(g, q2, engine="spark", spark=spark)["S"])
        assert local == dist == EXPECTED[name][1]
