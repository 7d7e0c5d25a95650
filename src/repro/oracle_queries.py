"""Recursive-CTE reference SQL for the paper's two evaluation queries.

Query 1 and Query 2 are *linear* context-free grammars, so their
context-free relations are expressible as SQL recursive CTEs over the
edge table ``e(src, label, dst)``. DuckDB executes these independently
of any repro engine, giving the oracle the tests use via
:func:`repro.oracle.assert_equivalent` — a broken join or fixpoint in
an engine shows up as a row diff against an implementation that shares
no code with it.
"""
from repro.cfg.queries import SCO, SCO_R, TYPE, TYPE_R

#: R_S of Query 1: S -> sco_r S sco | type_r S type | sco_r sco | type_r type
QUERY1_SQL = f"""
WITH RECURSIVE r(i, j) AS (
    SELECT a.src, b.dst
    FROM e a JOIN e b ON a.dst = b.src
    WHERE (a.label = '{SCO_R}' AND b.label = '{SCO}')
       OR (a.label = '{TYPE_R}' AND b.label = '{TYPE}')
    UNION
    SELECT a.src, b.dst
    FROM e a JOIN r ON a.dst = r.i JOIN e b ON r.j = b.src
    WHERE (a.label = '{SCO_R}' AND b.label = '{SCO}')
       OR (a.label = '{TYPE_R}' AND b.label = '{TYPE}')
)
SELECT i, j FROM r
"""

#: R_S of Query 2: S -> B sco | sco ; B -> sco_r B sco | sco_r sco
QUERY2_SQL = f"""
WITH RECURSIVE b(i, j) AS (
    SELECT a.src, c.dst
    FROM e a JOIN e c ON a.dst = c.src
    WHERE a.label = '{SCO_R}' AND c.label = '{SCO}'
    UNION
    SELECT a.src, c.dst
    FROM e a JOIN b ON a.dst = b.i JOIN e c ON b.j = c.src
    WHERE a.label = '{SCO_R}' AND c.label = '{SCO}'
)
SELECT i, j FROM (
    SELECT b.i AS i, c.dst AS j
    FROM b JOIN e c ON b.j = c.src
    WHERE c.label = '{SCO}'
    UNION
    SELECT src AS i, dst AS j FROM e WHERE label = '{SCO}'
)
"""

#: One closure round T·T restricted to a single rule A -> B C, as a
#: plain double join over the fact table t(i, j, nonterminal). Used to
#: oracle-check the Spark engine's multiply step in isolation.
SINGLE_RULE_PRODUCT_SQL = """
SELECT DISTINCT l.i AS i, r.j AS j
FROM t l JOIN t r ON l.j = r.i
WHERE l.nonterminal = '{b}' AND r.nonterminal = '{c}'
"""
