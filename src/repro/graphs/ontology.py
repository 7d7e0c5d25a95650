"""Synthetic stand-ins for the paper's RDF ontology dataset.

The paper evaluates on 11 public ontologies (skos ... pizza) plus three
synthetic graphs g1-g3 obtained "by simple repeating the existing
graphs". The RDF files are not available in this offline container, so
this module generates, deterministically per ontology name, a layered
class graph with exactly the paper's ``#triples``, built from the three
edge mechanisms real OWL ontologies exhibit and the two evaluation
queries are sensitive to:

1. **subClassOf taxonomy** — classes in ``depth+1`` layers of
   ``width`` each; a ``sub_frac`` share of the triple budget links
   classes to parents in the layer above, with a ``multi_frac`` share
   of that spent on *second* parents (multiple inheritance).
2. **class meta-typing ("punning")** — a ``chain_frac`` share of the
   ``type`` budget types classes into the layer above (real RDF:
   classes are instances of meta-classes). Assignment is by layer
   index, i.e. bijective per layer, so same-generation pairs lift
   level-by-level without collapsing.
3. **instance typing** — the rest of the ``type`` budget types
   instances into ``types_per_inst`` distinct classes of the *bottom*
   layer (multi-typed subjects, the base of all same-generation
   pairs).

Why these knobs: Query 1's result is seeded by co-typed class pairs
(mechanism 3: an instance with t types yields ~t^2 pairs inside the
bottom pool of ``width``^2) and multiplied by how many levels those
pairs lift through type/subClassOf chains (mechanisms 1-2). Query 2's
result is bounded below by the subClassOf edge count and grows with
multiple inheritance (co-parents seed its ``B`` relation), so
``sub_frac``/``multi_frac`` are sized against the paper's Query 2
column (near zero for skos/generations/wine, large for
biomedical/funding/pizza). Exact #results equality with the paper is
impossible without the original files; EXPERIMENTS.md records the
measured deltas.

The query graph is the paper's RDF conversion: forward plus ``_r``
inverse edges. The paper's g1/g2/g3 triple counts (8688, 14712,
15840) are exactly 8 x funding, 8 x wine and 8 x pizza, so they are
built as eight disjoint copies of those graphs.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.cfg.queries import SCO, TYPE
from repro.graphs.edges import Graph, repeat_graph


@dataclass(frozen=True)
class OntologySpec:
    """Shape parameters for one synthetic ontology (see module doc)."""

    n_triples: int
    sub_frac: float
    multi_frac: float
    chain_frac: float
    types_per_inst: int
    depth: int
    width: int
    seed: int
    #: type edges per meta-typed class: 1 = bijective chain to the
    #: layer above; 2+ = random targets, which multiplies lifted pairs
    #: (the "primitive hierarchy" ontologies need this for their large
    #: Query 1 results while keeping Query 2 small).
    metas_per_class: int = 1
    #: instances typed into the *entire* bottom layer (stand-in for the
    #: broadly-shared superclass/restriction structure that makes the
    #: primitive-hierarchy ontologies' Query 1 relations near-cliques).
    hub_insts: int = 0
    #: restrict subClassOf edges to layers 1..sub_depth (None = all
    #: layers). Concentrating the subClassOf budget near the top makes
    #: the co-parent structure dense there, which is what amplifies
    #: Query 2 beyond the raw subClassOf count (funding, pizza).
    sub_depth: int | None = None


#: Paper's ontology suite with its exact #triples, in table order.
#: Calibrated against the paper's #results columns (see module doc).
ONTOLOGY_SPECS: dict[str, OntologySpec] = {
    "skos": OntologySpec(252, 0.004, 0.0, 0.0, 9, 1, 28, 101),
    "generations": OntologySpec(273, 0.0, 0.0, 0.0, 20, 0, 46, 102),
    "travel": OntologySpec(277, 0.15, 0.20, 0.30, 8, 3, 25, 103),
    "univ-bench": OntologySpec(293, 0.18, 0.20, 0.30, 8, 3, 25, 104),
    "atom-primitive": OntologySpec(
        425, 0.25, 0.15, 0.28, 15, 1, 88, 105, metas_per_class=1, hub_insts=1
    ),
    "biomedical-measure-primitive": OntologySpec(
        459, 0.40, 0.75, 0.52, 15, 3, 71, 106,
        metas_per_class=1, hub_insts=1, sub_depth=3,
    ),
    "foaf": OntologySpec(631, 0.015, 0.0, 0.0, 25, 1, 64, 107),
    "people-pets": OntologySpec(640, 0.06, 0.10, 0.15, 18, 2, 55, 108),
    "funding": OntologySpec(
        1086, 0.22, 0.60, 0.26, 12, 4, 55, 109, sub_depth=3
    ),
    "wine": OntologySpec(1839, 0.07, 0.02, 0.27, 20, 4, 115, 110),
    "pizza": OntologySpec(
        1980, 0.16, 0.60, 0.30, 20, 5, 100, 111, sub_depth=2
    ),
}

#: Synthetic graphs: (base ontology, repetition factor) — 8x matches
#: the paper's #triples exactly.
SYNTHETIC_SPECS: dict[str, tuple[str, int]] = {
    "g1": ("funding", 8),
    "g2": ("wine", 8),
    "g3": ("pizza", 8),
}

#: All 14 graphs in the order of the paper's tables.
GRAPH_NAMES: tuple[str, ...] = tuple(ONTOLOGY_SPECS) + tuple(SYNTHETIC_SPECS)


def _layers(spec: OntologySpec) -> list[list[int]]:
    """Class node ids per layer: (depth+1) layers of `width` each,
    layer-major (layer 0 = top)."""
    return [
        list(range(d * spec.width, (d + 1) * spec.width))
        for d in range(spec.depth + 1)
    ]


def _sco_edges(
    spec: OntologySpec, layers: list[list[int]], rng: np.random.Generator
) -> list[tuple[int, str, int]]:
    """The subClassOf DAG: single parents first (classes chosen evenly
    across layers 1..depth), then multi-inheritance extras."""
    n_sub = round(spec.n_triples * spec.sub_frac)
    if n_sub == 0 or spec.depth == 0:
        return []
    n_single = max(1, round(n_sub * (1.0 - spec.multi_frac)))
    n_single = min(n_single, n_sub)
    sub_depth = min(spec.sub_depth or spec.depth, spec.depth)
    # Children eligible for a first parent, interleaved across layers so
    # a small budget still produces chains at every level.
    candidates = [
        (d, c)
        for i in range(spec.width)
        for d in range(1, sub_depth + 1)
        for c in [layers[d][i]]
    ]
    edges: set[tuple[int, str, int]] = set()
    for d, c in candidates[: min(n_single, len(candidates))]:
        parent = int(rng.choice(layers[d - 1]))
        edges.add((c, SCO, parent))
    # Extra (second, third, ...) parents go to *already-parented*
    # children — otherwise they would merely hand a first parent to an
    # orphan class and produce no co-parent pairs (the seed of the
    # same-generation B relation that Query 2 measures).
    # ... and their parents are drawn from the already-parented subset
    # of the layer above when possible, so lifted B-pairs keep finding
    # parents and the amplification compounds level over level.
    layer_of = {c: d for d, c in candidates}
    parented = sorted({c for c, _, _ in edges})
    parented_set = set(parented)
    needed = n_sub - len(edges)
    attempts = 0
    while needed > 0 and attempts < 1000 * n_sub:
        attempts += 1
        c = int(rng.choice(parented))
        d = layer_of[c]
        pool = [p for p in layers[d - 1] if p in parented_set] or layers[d - 1]
        parent = int(rng.choice(pool))
        e = (c, SCO, parent)
        if e not in edges:
            edges.add(e)
            needed -= 1
    if needed:
        raise RuntimeError(f"could not place {needed} extra subClassOf edges")
    return sorted(edges)


def ontology_graph(name: str) -> Graph:
    """The forward-triple graph for an ontology or synthetic name.

    Node layout: classes first (layer-major), then instances. The
    triple count equals the paper's exactly (asserted).
    """
    if name in SYNTHETIC_SPECS:
        base, k = SYNTHETIC_SPECS[name]
        return repeat_graph(ontology_graph(base), k)
    spec = ONTOLOGY_SPECS[name]
    rng = np.random.default_rng(spec.seed)
    layers = _layers(spec)
    n_classes = spec.width * (spec.depth + 1)
    edges = list(_sco_edges(spec, layers, rng))
    n_type = spec.n_triples - len(edges)

    # Class meta-typing: bottom layers first (they lift the instance
    # pairs). With metas_per_class == 1, class at index i is typed to
    # index i one layer up (bijective, lifted pair sets stay distinct);
    # with k >= 2, each class gets k random targets in the layer above,
    # multiplying lifted pairs.
    k = spec.metas_per_class
    budget = min(
        round(n_type * spec.chain_frac), (n_classes - spec.width) * k
    )
    chain_candidates: list[tuple[int, str, int]] = []
    for d in range(spec.depth, 0, -1):
        for i in range(spec.width):
            c = layers[d][i]
            if k == 1:
                chain_candidates.append((c, TYPE, layers[d - 1][i]))
            else:
                kk = min(k, spec.width)
                metas = rng.choice(layers[d - 1], size=kk, replace=False)
                chain_candidates.extend((c, TYPE, int(m)) for m in metas)
    edges.extend(chain_candidates[:budget])
    n_chain = len(chain_candidates[:budget])

    # Hub instances: typed into the whole bottom layer (see spec doc).
    bottom = layers[-1]
    remaining = n_type - n_chain
    n_inst = 0
    for _ in range(spec.hub_insts):
        cnt = min(len(bottom), remaining)
        if cnt <= 0:
            break
        inst = n_classes + n_inst
        n_inst += 1
        edges.extend((inst, TYPE, c) for c in bottom[:cnt])
        remaining -= cnt

    # Instance typing: into the bottom layer, t distinct classes each,
    # minting instances until the exact budget is spent.
    while remaining > 0:
        inst = n_classes + n_inst
        n_inst += 1
        cnt = min(spec.types_per_inst, len(bottom), remaining)
        classes = rng.choice(bottom, size=cnt, replace=False)
        edges.extend((inst, TYPE, int(c)) for c in classes)
        remaining -= cnt

    g = Graph.of(edges, n_classes + n_inst)
    if g.n_edges != spec.n_triples:
        raise AssertionError(
            f"{name}: generated {g.n_edges} triples, expected {spec.n_triples}"
        )
    return g


def query_graph(name: str) -> Graph:
    """The evaluated graph: forward triples plus RDF inverse edges."""
    return ontology_graph(name).with_inverses()


def n_triples(name: str) -> int:
    """The paper's #triples column for a graph name."""
    if name in SYNTHETIC_SPECS:
        base, k = SYNTHETIC_SPECS[name]
        return ONTOLOGY_SPECS[base].n_triples * k
    return ONTOLOGY_SPECS[name].n_triples
