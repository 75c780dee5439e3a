"""The biomedical benchmark queries (App. C): E2E pipeline + clinical.

The E2E pipeline (cancer driver-gene analysis, App. C.2) has five
steps; each step's materialized output feeds the next:

1. **HybridMatrix** — mutation impact × copy number per sample
   (nested join of Occurrences at levels 1 and 2, aggregated per gene);
2. **SampleNetwork** — hybrid scores propagated over network edges;
3. **EffectMatrix** — node scores × hybrid scores;
4. **ConnectMatrix** — effect scores × gene expression;
5. **Connectivity** — flat: connection scores summed across samples.

Two published queries needed a mechanical adaptation (documented in
DESIGN.md): Step 2's snippet references ``h.hscore`` outside any
iteration of ``h.scores`` (a typo in the paper) — we iterate
``h.scores`` explicitly; generator order in Steps 2/3 is arranged so
equality conditions attach to input-bag generators (our compiler does
not support filters on non-root path generators; the queries are
semantically identical).

Clinical exploration queries C₁–C₃ (App. C.3) restructure/join/
aggregate Occurrences per sample; C₂/C₃ join the per-gene copy-number
table, as in the published query text.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from .. import biomed_data as B
from ..core import nrc as N
from ..spark_backend.catalog import Catalog


def P(v: str, a: str) -> N.Expr:
    return N.Proj(N.Var(v), a)


def comp(gens: list[tuple[str, N.Expr]], cond: N.Expr | None, head: N.TupleE) -> N.Expr:
    """for g1 in s1 union … union (if cond then) {head}.

    Each conjunct of ``cond`` is placed directly after the *last*
    generator it references, as a hand-written NRC query would — this
    also lets the reference interpreter's hash-join fast path fire.
    """
    conjuncts: list[N.Expr] = []

    def split(c: N.Expr) -> None:
        if isinstance(c, N.PrimOp) and c.op == "&&":
            split(c.left)
            split(c.right)
        else:
            conjuncts.append(c)

    if cond is not None:
        split(cond)
    gen_vars = [v for v, _ in gens]
    # index of the last local generator each conjunct references
    placed: dict[int, list[N.Expr]] = {i: [] for i in range(len(gens))}
    for c in conjuncts:
        fv = N.free_vars(c)
        idxs = [i for i, v in enumerate(gen_vars) if v in fv]
        placed[max(idxs) if idxs else 0].append(c)

    body: N.Expr = N.Singleton(head)
    for i in range(len(gens) - 1, -1, -1):
        for c in reversed(placed[i]):
            body = N.IfThen(c, body)
        var, src = gens[i]
        body = N.ForUnion(var, src, body)
    return body


# ---------------------------------------------------------------------------
# Input types (App. C.1)
# ---------------------------------------------------------------------------

CONSEQ_T = N.tuple_t(conseq=N.STRING)
CANDIDATE_T = N.tuple_t(
    gene=N.STRING, impact=N.STRING, sift=N.REAL, poly=N.REAL,
    consequences=N.BagT(CONSEQ_T),
)
OCCURRENCES_T = N.BagT(
    N.tuple_t(
        sample=N.STRING, contig=N.STRING, start=N.INT, end=N.INT,
        reference=N.STRING, alternate=N.STRING, mutationId=N.STRING,
        candidates=N.BagT(CANDIDATE_T),
    )
)
VEP_T = N.BagT(
    N.tuple_t(
        contig=N.STRING, start=N.INT, end=N.INT, reference=N.STRING,
        alternate=N.STRING, mutationId=N.STRING,
        candidates=N.BagT(CANDIDATE_T),
    )
)
NETWORK_T = N.BagT(
    N.tuple_t(
        nodeProtein=N.STRING,
        edges=N.BagT(N.tuple_t(edgeProtein=N.STRING, distance=N.INT)),
    )
)
BASE_TYPES: dict[str, N.Type] = {
    "Samples": N.BagT(N.tuple_t(sample=N.STRING, aliquot=N.STRING)),
    "Occurrences": OCCURRENCES_T,
    "CopyNumber": N.BagT(
        N.tuple_t(aliquot=N.STRING, gene=N.STRING, cnum=N.INT)
    ),
    "CopyNumberG": N.BagT(N.tuple_t(gene=N.STRING, cnum=N.INT)),
    "Network": NETWORK_T,
    "GeneExpression": N.BagT(
        N.tuple_t(aliquot=N.STRING, gene=N.STRING, fpkm=N.REAL)
    ),
    "SOImpact": N.BagT(N.tuple_t(conseq=N.STRING, value=N.REAL)),
    "Biomart": N.BagT(N.tuple_t(gene=N.STRING, protein=N.STRING)),
    "MAF": N.BagT(N.tuple_t(sample=N.STRING, mutationId=N.STRING)),
    "VEP": VEP_T,
}


def load_biomed(
    spark: SparkSession,
    n_samples: int = 30,
    muts_per_sample: int = 40,
    skew: float = 0.0,
    seed: int = 0,
) -> Catalog:
    """Generate + register all biomedical inputs."""
    n_genes = max(10 * n_samples, 100)
    n_prot = max(5 * n_samples, 50)
    cat = Catalog()
    cat.add("Samples", B.samples(spark, n_samples, seed=11 + seed))
    cat.add(
        "Occurrences",
        B.occurrences(
            spark, n_samples, muts_per_sample=muts_per_sample,
            n_genes=n_genes, skew=skew, seed=13 + seed,
        ),
    )
    cat.add("CopyNumber", B.copy_number(spark, n_samples, n_genes, seed=17 + seed))
    cat.add("CopyNumberG", B.copy_number_g(spark, n_genes, seed=18 + seed))
    cat.add("Network", B.network(spark, n_prot, seed=19 + seed))
    cat.add(
        "GeneExpression",
        B.gene_expression(spark, n_samples, n_genes, seed=23 + seed),
    )
    cat.add("SOImpact", B.so_impact(spark), unique={"conseq"})
    cat.add("Biomart", B.biomart(spark, n_genes, n_prot, seed=29 + seed))
    cat.add("MAF", B.maf(spark, seed=31 + seed))
    cat.add("VEP", B.vep(spark, n_genes=n_genes, seed=37 + seed))
    return cat


# ---------------------------------------------------------------------------
# E2E pipeline (App. C.2)
# ---------------------------------------------------------------------------

_IMPACT_SCORE = N.IfThen(
    N.eq(P("t", "impact"), N.const("HIGH")),
    N.const(0.8),
    N.IfThen(
        N.eq(P("t", "impact"), N.const("MODERATE")),
        N.const(0.5),
        N.IfThen(
            N.eq(P("t", "impact"), N.const("LOW")),
            N.const(0.3),
            N.IfThen(
                N.eq(P("t", "impact"), N.const("MODIFIER")),
                N.const(0.15),
                N.const(0.01),
            ),
        ),
    ),
)


def step1() -> N.Expr:
    """HybridMatrix ⇐ per-sample hybrid scores (App. C.2.1)."""
    score = N.PrimOp(
        "*",
        N.PrimOp(
            "*",
            N.PrimOp("*", _IMPACT_SCORE, P("v", "value")),
            N.PrimOp("+", P("n", "cnum"), N.const(0.01)),
        ),
        N.PrimOp("*", P("t", "sift"), P("t", "poly")),
    )
    scores = N.SumBy(
        ("gene",),
        ("score",),
        comp(
            [
                ("o", N.Var("Occurrences")),
                ("t", P("o", "candidates")),
                ("n", N.Var("CopyNumber")),
                ("c", P("t", "consequences")),
                ("v", N.Var("SOImpact")),
            ],
            N.and_(
                N.eq(P("o", "sample"), P("s", "sample")),
                N.eq(P("s", "aliquot"), P("n", "aliquot")),
                N.eq(P("n", "gene"), P("t", "gene")),
                N.eq(P("c", "conseq"), P("v", "conseq")),
            ),
            N.TupleE((("gene", P("t", "gene")), ("score", score))),
        ),
    )
    return N.ForUnion(
        "s",
        N.Var("Samples"),
        N.Singleton(
            N.TupleE(
                (
                    ("sample", P("s", "sample")),
                    ("aliquot", P("s", "aliquot")),
                    ("scores", scores),
                )
            )
        ),
    )


def step2() -> N.Expr:
    """SampleNetwork ⇐ hybrid scores propagated over edges (C.2.2)."""
    nodes = N.SumBy(
        ("nodeProtein",),
        ("score",),
        comp(
            [
                ("y", P("h", "scores")),
                ("nw", N.Var("Network")),
                ("e", P("nw", "edges")),
                ("b", N.Var("Biomart")),
            ],
            N.and_(
                N.eq(P("e", "edgeProtein"), P("b", "protein")),
                N.eq(P("b", "gene"), P("y", "gene")),
            ),
            N.TupleE(
                (
                    ("nodeProtein", P("nw", "nodeProtein")),
                    ("score", N.PrimOp("*", P("e", "distance"), P("y", "score"))),
                )
            ),
        ),
    )
    return N.ForUnion(
        "h",
        N.Var("HybridMatrix"),
        N.Singleton(
            N.TupleE(
                (
                    ("sample", P("h", "sample")),
                    ("aliquot", P("h", "aliquot")),
                    ("nodes", nodes),
                )
            )
        ),
    )


def step3() -> N.Expr:
    """EffectMatrix ⇐ node scores × hybrid scores (C.2.3)."""
    scores = comp(
        [
            ("s2", N.Var("SampleNetwork")),
            ("nd", P("s2", "nodes")),
            ("y", P("h", "scores")),
            ("b", N.Var("Biomart")),
        ],
        N.and_(
            N.eq(P("h", "sample"), P("s2", "sample")),
            N.eq(P("h", "aliquot"), P("s2", "aliquot")),
            N.eq(P("nd", "nodeProtein"), P("b", "protein")),
            N.eq(P("y", "gene"), P("b", "gene")),
        ),
        N.TupleE(
            (
                ("gene", P("y", "gene")),
                ("score", N.PrimOp("*", P("nd", "score"), P("y", "score"))),
            )
        ),
    )
    return N.ForUnion(
        "h",
        N.Var("HybridMatrix"),
        N.Singleton(
            N.TupleE(
                (
                    ("sample", P("h", "sample")),
                    ("aliquot", P("h", "aliquot")),
                    ("scores", scores),
                )
            )
        ),
    )


def step4() -> N.Expr:
    """ConnectMatrix ⇐ effect scores × gene expression (C.2.3, Step 4)."""
    scores = N.SumBy(
        ("gene",),
        ("score",),
        comp(
            [("x", P("em", "scores")), ("g", N.Var("GeneExpression"))],
            N.and_(
                N.eq(P("x", "gene"), P("g", "gene")),
                N.eq(P("em", "aliquot"), P("g", "aliquot")),
            ),
            N.TupleE(
                (
                    ("gene", P("x", "gene")),
                    ("score", N.PrimOp("*", P("x", "score"), P("g", "fpkm"))),
                )
            ),
        ),
    )
    return N.ForUnion(
        "em",
        N.Var("EffectMatrix"),
        N.Singleton(
            N.TupleE(
                (
                    ("sample", P("em", "sample")),
                    ("aliquot", P("em", "aliquot")),
                    ("scores", scores),
                )
            )
        ),
    )


def step5() -> N.Expr:
    """Connectivity ⇐ flat gene connectivity across samples (C.2.4)."""
    return N.SumBy(
        ("gene",),
        ("score",),
        comp(
            [("cm", N.Var("ConnectMatrix")), ("c", P("cm", "scores"))],
            None,
            N.TupleE(
                (("gene", P("c", "gene")), ("score", P("c", "score")))
            ),
        ),
    )


STEP_NAMES = [
    "HybridMatrix",
    "SampleNetwork",
    "EffectMatrix",
    "ConnectMatrix",
    "Connectivity",
]
STEPS = [step1, step2, step3, step4, step5]


def pipeline_types() -> dict[str, N.Type]:
    """Types of all inputs + intermediate pipeline outputs."""
    env = dict(BASE_TYPES)
    for name, step in zip(STEP_NAMES, STEPS):
        env[name] = N.infer_type(step(), env)
    return env


# ---------------------------------------------------------------------------
# Clinical exploration queries (App. C.3)
# ---------------------------------------------------------------------------


def clinical_c1() -> N.Expr:
    """C₁: group occurrences by sample; score consequences (C.3.1)."""
    consequences = comp(
        [("c", P("t", "consequences")), ("i", N.Var("SOImpact"))],
        N.eq(P("c", "conseq"), P("i", "conseq")),
        N.TupleE(
            (("conseq", P("i", "conseq")), ("score", P("i", "value")))
        ),
    )
    candidates = comp(
        [("t", P("o", "candidates"))],
        None,
        N.TupleE(
            (
                ("gene", P("t", "gene")),
                ("sift", P("t", "sift")),
                ("poly", P("t", "poly")),
                ("consequences", consequences),
            )
        ),
    )
    mutations = comp(
        [("o", N.Var("Occurrences"))],
        N.eq(P("s", "sample"), P("o", "sample")),
        N.TupleE(
            (
                ("mutationId", P("o", "mutationId")),
                ("contig", P("o", "contig")),
                ("candidates", candidates),
            )
        ),
    )
    return N.ForUnion(
        "s",
        N.Var("Samples"),
        N.Singleton(
            N.TupleE(
                (("sample", P("s", "sample")), ("mutations", mutations))
            )
        ),
    )


def clinical_c2() -> N.Expr:
    """C₂: C₁ + per-gene copy number joined at level 2 (C.3.2)."""
    consequences = comp(
        [("c", P("t", "consequences")), ("i", N.Var("SOImpact"))],
        N.eq(P("c", "conseq"), P("i", "conseq")),
        N.TupleE(
            (("conseq", P("i", "conseq")), ("score", P("i", "value")))
        ),
    )
    candidates = comp(
        [("t", P("o", "candidates")), ("g", N.Var("CopyNumberG"))],
        N.eq(P("g", "gene"), P("t", "gene")),
        N.TupleE(
            (
                ("gene", P("t", "gene")),
                ("cnum", P("g", "cnum")),
                ("consequences", consequences),
            )
        ),
    )
    mutations = comp(
        [("o", N.Var("Occurrences"))],
        N.eq(P("s", "sample"), P("o", "sample")),
        N.TupleE(
            (
                ("mutationId", P("o", "mutationId")),
                ("candidates", candidates),
            )
        ),
    )
    return N.ForUnion(
        "s",
        N.Var("Samples"),
        N.Singleton(
            N.TupleE(
                (("sample", P("s", "sample")), ("mutations", mutations))
            )
        ),
    )


def clinical_c3() -> N.Expr:
    """C₃: aggregate cnum × consequence score per gene (C.3.3)."""
    candidates = N.SumBy(
        ("gene",),
        ("score",),
        comp(
            [
                ("t", P("o", "candidates")),
                ("g", N.Var("CopyNumberG")),
                ("c", P("t", "consequences")),
                ("i", N.Var("SOImpact")),
            ],
            N.and_(
                N.eq(P("g", "gene"), P("t", "gene")),
                N.eq(P("c", "conseq"), P("i", "conseq")),
            ),
            N.TupleE(
                (
                    ("gene", P("t", "gene")),
                    ("score", N.PrimOp("*", P("g", "cnum"), P("i", "value"))),
                )
            ),
        ),
    )
    mutations = comp(
        [("o", N.Var("Occurrences"))],
        N.eq(P("s", "sample"), P("o", "sample")),
        N.TupleE(
            (
                ("mutationId", P("o", "mutationId")),
                ("candidates", candidates),
            )
        ),
    )
    return N.ForUnion(
        "s",
        N.Var("Samples"),
        N.Singleton(
            N.TupleE(
                (("sample", P("s", "sample")), ("mutations", mutations))
            )
        ),
    )


CLINICAL = {"C1": clinical_c1, "C2": clinical_c2, "C3": clinical_c3}


def sharing_query() -> N.Expr:
    """MAF ⋈ VEP annotation query for the App. D sharing experiment."""
    consequences = comp(
        [("c", P("t", "consequences"))],
        None,
        N.TupleE((("conseq", P("c", "conseq")),)),
    )
    candidates = comp(
        [("t", P("v", "candidates"))],
        None,
        N.TupleE(
            (
                ("gene", P("t", "gene")),
                ("impact", P("t", "impact")),
                ("sift", P("t", "sift")),
                ("poly", P("t", "poly")),
                ("consequences", consequences),
            )
        ),
    )
    return comp(
        [("m", N.Var("MAF")), ("v", N.Var("VEP"))],
        N.eq(P("m", "mutationId"), P("v", "mutationId")),
        N.TupleE(
            (
                ("sample", P("m", "sample")),
                ("mutationId", P("m", "mutationId")),
                ("candidates", candidates),
            )
        ),
    )
