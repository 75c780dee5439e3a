"""SparkSQL competitor (§6): hand-written SQL under the paper's rules.

The paper's SparkSQL baseline is written under two restrictions it
documents (App. E.2): ``explode`` must stay with the source relation
in the FROM clause (LATERAL VIEW), and a join cannot follow an
explode inside one SELECT — so queries over nested input are forced
to fully flatten first (with per-level ids for regrouping), join,
aggregate, and rebuild nesting with ``collect_list(named_struct(…))``
level by level.  We generate exactly that SQL for the TPC-H families
and the biomedical pipeline steps.

NULL handling matches the Γ operators: structs are built under
``CASE WHEN <join-key> IS NOT NULL`` so ``collect_list`` skips
outer-join misses, preserving empty inner bags.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from ..bench import tpch_queries as TQ
from .catalog import Catalog


def run_sql(spark: SparkSession, catalog: Catalog, sql: str) -> DataFrame:
    """Register catalog tables as temp views and run the SQL."""
    for name, df in catalog.tables.items():
        df.createOrReplaceTempView(name)
    return spark.sql(sql)


# ---------------------------------------------------------------------------
# TPC-H families
# ---------------------------------------------------------------------------


def _specs(level: int):
    return list(reversed(TQ._SPECS[: level + 1]))  # top-first


def _attrs(spec, wide):
    return TQ._attrs(spec, wide)


def flat_to_nested_sql(level: int, wide: bool = False) -> str:
    """Successive group-by + collect_list over the base tables.

    Each level's subquery exposes ``__jk`` — the column linking it to
    its parent — plus its output attributes and (for non-leaf levels)
    the already-built inner bag.
    """
    specs = _specs(level)

    def build(i: int, parent_ck: str | None) -> tuple[str, list[str]]:
        """Returns (sql, exposed output names) for the level-i subtree."""
        s = specs[i]
        a = s.var
        attrs = _attrs(s, wide)
        sel = [f"{a}.{col} AS {out}" for out, col in attrs]
        outs = [out for out, _ in attrs]
        jk = [f"{a}.{parent_ck} AS __jk"] if parent_ck else []
        if i + 1 == len(specs):
            sql = f"SELECT {', '.join(jk + sel)} FROM {s.table} {a}"
            return sql, outs
        bag, pk, ck = s.child
        sub_sql, sub_outs = build(i + 1, ck)
        struct = ", ".join(f"'{o}', __s.{o}" for o in sub_outs)
        group_cols = [f"{a}.{pk}"] + (
            [f"{a}.{parent_ck}"] if parent_ck else []
        ) + [f"{a}.{col}" for _, col in attrs]
        sql = (
            f"SELECT {', '.join(jk + sel)}, "
            f"collect_list(CASE WHEN __s.__jk IS NOT NULL THEN "
            f"named_struct({struct}) END) AS {bag} "
            f"FROM {s.table} {a} LEFT JOIN ({sub_sql}) __s "
            f"ON {a}.{pk} = __s.__jk "
            f"GROUP BY {', '.join(dict.fromkeys(group_cols))}"
        )
        return sql, outs + [bag]

    sql, _ = build(0, None)
    return sql


def _flatten_nested(view: str, level: int, wide: bool, outer: bool) -> tuple[str, list[str], list[str]]:
    """FROM clause flattening a nested view with per-level ids.

    Returns (sql, id columns, exposed columns).
    """
    specs = _specs(level)
    bags = TQ._bag_field_names(level)
    ids = ["_id0"]
    cur = (
        f"(SELECT monotonically_increasing_id() AS _id0, * FROM {view}) x0"
    )
    exposed: list[str] = [out for out, _ in _attrs(specs[0], wide)]
    lv = "LATERAL VIEW OUTER" if outer else "LATERAL VIEW"
    for i, bag in enumerate(bags):
        # element fields exposed at the next level: its attributes
        # (at the leaf, the pid/qty pair) plus the deeper bag if any
        inner_attrs = [out for out, _ in _attrs(specs[i + 1], wide)]
        nxt_bag = bags[i + 1] if i + 1 < len(bags) else None
        struct_fields = inner_attrs + ([nxt_bag] if nxt_bag else [])
        keep = ids + exposed
        proj = ", ".join(
            keep + [f"x{i+1}.{f} AS {f}" for f in struct_fields]
        )
        new_id = f"_id{i+1}"
        cur = (
            f"(SELECT monotonically_increasing_id() AS {new_id}, {proj} "
            f"FROM {cur} {lv} explode({bag}) t{i+1} AS x{i+1}) y{i+1}"
        )
        ids.append(new_id)
        exposed.extend(inner_attrs)
    return cur, ids, exposed


def nested_to_nested_sql(level: int, wide: bool, view: str) -> str:
    """Flatten fully, join Part, aggregate, rebuild nesting upward."""
    if level == 0:
        return nested_to_flat_sql(level, wide, view)
    specs = _specs(level)
    bags = TQ._bag_field_names(level)
    flat, ids, exposed = _flatten_nested(view, level, wide, outer=True)
    leaf_outs = {out for out, _ in _attrs(specs[level], wide)}
    upper = [c for c in exposed if c not in leaf_outs]
    grp = ids[:-1] + upper
    agg = (
        f"SELECT {', '.join(grp)}, p.p_name AS pname, "
        f"sum(f.qty * p.p_retailprice) AS total "
        f"FROM (SELECT * FROM {flat}) f LEFT JOIN Part p "
        f"ON f.pid = p.p_partkey "
        f"GROUP BY {', '.join(grp)}, p.p_name"
    )
    cur = f"({agg}) g{level}"
    cur_fields = ["pname", "total"]
    # rebuild: innermost bag gets (pname, total); climb to the top
    for i in range(level - 1, -1, -1):
        keep_ids = ids[: i + 1]
        keep_attrs: list[str] = []
        for j in range(i + 1):
            keep_attrs += [out for out, _ in _attrs(specs[j], wide)]
        bag = bags[i]
        struct = ", ".join(f"'{f}', {f}" for f in cur_fields)
        marker = cur_fields[0]
        sel_ids = ", ".join(keep_ids + keep_attrs)
        cur = (
            f"(SELECT {sel_ids}, collect_list(CASE WHEN {marker} IS NOT NULL "
            f"THEN named_struct({struct}) END) AS {bag} FROM {cur} "
            f"GROUP BY {sel_ids}) r{i}"
        )
        cur_fields = [out for out, _ in _attrs(specs[i], wide)] + [bag]
    final = ", ".join(cur_fields)
    return f"SELECT {final} FROM {cur}"


def nested_to_flat_sql(level: int, wide: bool, view: str) -> str:
    """Flatten fully (inner), join Part, aggregate at the top."""
    specs = _specs(level)
    if level == 0:
        return (
            f"SELECT p.p_name AS pname, sum(v.qty * p.p_retailprice) AS total "
            f"FROM {view} v JOIN Part p ON v.pid = p.p_partkey "
            f"GROUP BY p.p_name"
        )
    flat, ids, exposed = _flatten_nested(view, level, wide, outer=False)
    top_keys = [out for out, _ in _attrs(specs[0], wide)]
    if not wide:
        top_keys = top_keys[:1]
    keys = ", ".join(top_keys + ["p.p_name"])
    out_keys = ", ".join(top_keys) + ", p.p_name AS pname"
    return (
        f"SELECT {out_keys}, sum(f.qty * p.p_retailprice) AS total "
        f"FROM (SELECT * FROM {flat}) f JOIN Part p ON f.pid = p.p_partkey "
        f"GROUP BY {keys}"
    )


# ---------------------------------------------------------------------------
# Biomedical pipeline (App. C.2) — flattening SQL per step
# ---------------------------------------------------------------------------

STEP1_SQL = """
SELECT s.sample, s.aliquot,
       collect_list(CASE WHEN h.gene IS NOT NULL
                    THEN named_struct('gene', h.gene, 'score', h.score) END) AS scores
FROM Samples s LEFT JOIN (
  SELECT f.sample, cn.aliquot, f.gene,
         sum(f.impact_score * si.value * (cn.cnum + 0.01) * f.sift * f.poly) AS score
  FROM (
    SELECT o.sample, t.gene, t.sift, t.poly, c.conseq,
           CASE WHEN t.impact = 'HIGH' THEN 0.8
                WHEN t.impact = 'MODERATE' THEN 0.5
                WHEN t.impact = 'LOW' THEN 0.3
                WHEN t.impact = 'MODIFIER' THEN 0.15
                ELSE 0.01 END AS impact_score
    FROM Occurrences o
    LATERAL VIEW explode(o.candidates) tc AS t
    LATERAL VIEW explode(t.consequences) cc AS c
  ) f
  JOIN Samples s2 ON f.sample = s2.sample
  JOIN CopyNumber cn ON cn.aliquot = s2.aliquot AND cn.gene = f.gene
  JOIN SOImpact si ON si.conseq = f.conseq
  GROUP BY f.sample, cn.aliquot, f.gene
) h ON s.sample = h.sample AND s.aliquot = h.aliquot
GROUP BY s.sample, s.aliquot
"""

STEP2_SQL = """
SELECT h.sample, h.aliquot,
       collect_list(CASE WHEN n.nodeProtein IS NOT NULL
                    THEN named_struct('nodeProtein', n.nodeProtein, 'score', n.score) END) AS nodes
FROM HybridMatrix h LEFT JOIN (
  SELECT hs.sample, hs.aliquot, ne.nodeProtein,
         sum(ne.distance * hs.score) AS score
  FROM (
    SELECT h2.sample, h2.aliquot, y.gene, y.score
    FROM HybridMatrix h2 LATERAL VIEW explode(h2.scores) ys AS y
  ) hs
  JOIN Biomart b ON b.gene = hs.gene
  JOIN (
    SELECT nw.nodeProtein, e.edgeProtein, e.distance
    FROM Network nw LATERAL VIEW explode(nw.edges) es AS e
  ) ne ON ne.edgeProtein = b.protein
  GROUP BY hs.sample, hs.aliquot, ne.nodeProtein
) n ON h.sample = n.sample AND h.aliquot = n.aliquot
GROUP BY h.sample, h.aliquot
"""

STEP3_SQL = """
SELECT h.sample, h.aliquot,
       collect_list(CASE WHEN j.gene IS NOT NULL
                    THEN named_struct('gene', j.gene, 'score', j.score) END) AS scores
FROM HybridMatrix h LEFT JOIN (
  SELECT sn.sample, sn.aliquot, hs.gene, sn.score * hs.score AS score
  FROM (
    SELECT s2.sample, s2.aliquot, nd.nodeProtein, nd.score
    FROM SampleNetwork s2 LATERAL VIEW explode(s2.nodes) ns AS nd
  ) sn
  JOIN Biomart b ON sn.nodeProtein = b.protein
  JOIN (
    SELECT h2.sample, h2.aliquot, y.gene, y.score
    FROM HybridMatrix h2 LATERAL VIEW explode(h2.scores) ys AS y
  ) hs ON hs.sample = sn.sample AND hs.aliquot = sn.aliquot AND hs.gene = b.gene
) j ON h.sample = j.sample AND h.aliquot = j.aliquot
GROUP BY h.sample, h.aliquot
"""

STEP4_SQL = """
SELECT em.sample, em.aliquot,
       collect_list(CASE WHEN j.gene IS NOT NULL
                    THEN named_struct('gene', j.gene, 'score', j.score) END) AS scores
FROM EffectMatrix em LEFT JOIN (
  SELECT es.sample, es.aliquot, es.gene, sum(es.score * g.fpkm) AS score
  FROM (
    SELECT e2.sample, e2.aliquot, x.gene, x.score
    FROM EffectMatrix e2 LATERAL VIEW explode(e2.scores) xs AS x
  ) es
  JOIN GeneExpression g ON g.gene = es.gene AND g.aliquot = es.aliquot
  GROUP BY es.sample, es.aliquot, es.gene
) j ON em.sample = j.sample AND em.aliquot = j.aliquot
GROUP BY em.sample, em.aliquot
"""

STEP5_SQL = """
SELECT c.gene, sum(c.score) AS score
FROM ConnectMatrix cm LATERAL VIEW explode(cm.scores) cs AS c
GROUP BY c.gene
"""

BIOMED_STEP_SQL = [STEP1_SQL, STEP2_SQL, STEP3_SQL, STEP4_SQL, STEP5_SQL]
