"""The paper's published Tables 1 and 2, transcribed verbatim.

Each row: ``name -> (n_triples, n_results, GLL_ms, dGPU_ms, sCPU_ms,
sGPU_ms)``; ``None`` where the paper omits dGPU on the large graphs
("a dense matrix representation significantly degrades performance").
Used by the bench harness and ``jobs/table*.py`` to print paper-vs-
measured side by side, and by tests to pin the #triples of the
synthetic dataset substitute.
"""
from __future__ import annotations

PaperRow = tuple[int, int, int | None, int | None, int | None, int | None]

#: Table 1 — Query 1 (same-generation, same layer).
PAPER_TABLE1: dict[str, PaperRow] = {
    "skos": (252, 810, 10, 56, 14, 12),
    "generations": (273, 2164, 19, 62, 20, 13),
    "travel": (277, 2499, 24, 69, 22, 30),
    "univ-bench": (293, 2540, 25, 81, 25, 15),
    "atom-primitive": (425, 15454, 255, 190, 92, 22),
    "biomedical-measure-primitive": (459, 15156, 261, 266, 113, 20),
    "foaf": (631, 4118, 39, 154, 48, 9),
    "people-pets": (640, 9472, 89, 392, 142, 32),
    "funding": (1086, 17634, 212, 1410, 447, 36),
    "wine": (1839, 66572, 819, 2047, 797, 54),
    "pizza": (1980, 56195, 697, 1104, 430, 24),
    "g1": (8688, 141072, 1926, None, 26957, 82),
    "g2": (14712, 532576, 6246, None, 46809, 185),
    "g3": (15840, 449560, 7014, None, 24967, 127),
}

#: Table 2 — Query 2 (same-generation, adjacent layers).
PAPER_TABLE2: dict[str, PaperRow] = {
    "skos": (252, 1, 1, 10, 2, 1),
    "generations": (273, 0, 1, 9, 2, 0),
    "travel": (277, 63, 1, 31, 7, 10),
    "univ-bench": (293, 81, 11, 55, 15, 9),
    "atom-primitive": (425, 122, 66, 36, 9, 2),
    "biomedical-measure-primitive": (459, 2871, 45, 276, 91, 24),
    "foaf": (631, 10, 2, 53, 14, 3),
    "people-pets": (640, 37, 3, 144, 38, 6),
    "funding": (1086, 1158, 23, 1246, 344, 27),
    "wine": (1839, 133, 8, 722, 179, 6),
    "pizza": (1980, 1262, 29, 943, 258, 23),
    "g1": (8688, 9264, 167, None, 21115, 38),
    "g2": (14712, 1064, 46, None, 10874, 21),
    "g3": (15840, 10096, 393, None, 15736, 40),
}
