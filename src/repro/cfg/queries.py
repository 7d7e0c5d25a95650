"""The paper's grammars: worked example (§4.3) and evaluation queries.

Edge-label conventions: the paper writes ``subClassOf⁻¹`` for the
inverse edge added during RDF conversion; here inverse labels carry the
suffix ``_r`` (see :func:`repro.graphs.edges.with_inverses`).
"""
from __future__ import annotations

from repro.cfg.grammar import CFG

SCO = "subClassOf"
SCO_R = "subClassOf_r"
TYPE = "type"
TYPE_R = "type_r"


def query1() -> CFG:
    """Query 1 (paper Figure 10): same-generation, same layer.

    ``S -> subClassOf⁻¹ S subClassOf | type⁻¹ S type
       | subClassOf⁻¹ subClassOf | type⁻¹ type``
    """
    return CFG.of(
        [
            ("S", (SCO_R, "S", SCO)),
            ("S", (TYPE_R, "S", TYPE)),
            ("S", (SCO_R, SCO)),
            ("S", (TYPE_R, TYPE)),
        ]
    )


def query2() -> CFG:
    """Query 2 (paper Figure 11): same-generation, adjacent layers.

    ``S -> B subClassOf | subClassOf``
    ``B -> subClassOf⁻¹ B subClassOf | subClassOf⁻¹ subClassOf``
    """
    return CFG.of(
        [
            ("S", ("B", SCO)),
            ("S", (SCO,)),
            ("B", (SCO_R, "B", SCO)),
            ("B", (SCO_R, SCO)),
        ]
    )


def example_grammar_cnf() -> CFG:
    """The paper's hand-normalized grammar G' (Figure 4).

    Identical non-terminal names (S, S1..S6) as in the paper so the
    worked example's matrices T0..T5 (Figures 6-8) can be asserted
    verbatim.
    """
    return CFG.of(
        [
            ("S", ("S1", "S5")),
            ("S", ("S3", "S6")),
            ("S", ("S1", "S2")),
            ("S", ("S3", "S4")),
            ("S5", ("S", "S2")),
            ("S6", ("S", "S4")),
            ("S1", (SCO_R,)),
            ("S2", (SCO,)),
            ("S3", (TYPE_R,)),
            ("S4", (TYPE,)),
        ]
    )


def example_graph_edges() -> list[tuple[int, str, int]]:
    """The worked example's input graph (paper Figure 5), reconstructed
    from the initial matrix T0 (Figure 6):

    ``T0[0,0]={S1}, T0[0,1]={S3}, T0[1,2]={S3}, T0[2,0]={S2}, T0[2,2]={S4}``
    with S1->subClassOf⁻¹, S2->subClassOf, S3->type⁻¹, S4->type.
    """
    return [
        (0, SCO_R, 0),
        (0, TYPE_R, 1),
        (1, TYPE_R, 2),
        (2, SCO, 0),
        (2, TYPE, 2),
    ]
