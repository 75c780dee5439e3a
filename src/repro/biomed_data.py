"""Synthetic biomedical benchmark data (App. C schemas).

The paper evaluates on ICGC/GDC data (280 GB Occurrences from MAF
files + VEP annotations, STRING protein networks, GDC copy-number /
expression).  Those datasets are access-controlled and far beyond
container scale, so we generate schema-faithful synthetic equivalents
(documented substitution — DESIGN.md §2):

* ``occurrences`` — two-level nested (mutations → candidates →
  consequences); candidate-set sizes are Zipf-distributed (the
  VEP ``--distance`` flag effect: larger flanking regions ⇒ bigger,
  more skewed candidate sets); ``mutationId`` values are drawn from a
  shared pool across samples (cancer samples share driver mutations —
  the sharing that App. D's succinctness microexperiment measures);
* ``network`` — one-level nested protein→edges with Zipf degrees;
* flat ``copy_number``, ``gene_expression``, ``samples``,
  ``so_impact``, ``biomart``;
* ``maf`` + ``vep`` — the raw somatic-mutation file and unique
  annotation table used by the App. D sharing microexperiment.

Sizes scale with ``n_samples``; all generators are deterministic in
``seed``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

SO_TERMS = [
    ("transcript_ablation", 1.0),
    ("stop_gained", 0.95),
    ("frameshift_variant", 0.9),
    ("stop_lost", 0.85),
    ("start_lost", 0.8),
    ("missense_variant", 0.7),
    ("splice_region_variant", 0.5),
    ("synonymous_variant", 0.3),
    ("intron_variant", 0.15),
    ("intergenic_variant", 0.05),
]
IMPACTS = ["HIGH", "MODERATE", "LOW", "MODIFIER"]


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _zipf_sizes(g, n, max_size, alpha=1.3):
    sizes = np.minimum(
        np.ceil(g.zipf(alpha, n) * 0.8).astype(int), max_size
    )
    return np.maximum(sizes, 1)


def samples(spark: SparkSession, n_samples: int = 50, seed: int = 11) -> DataFrame:
    """Sample → aliquot mapping (one aliquot per sample here)."""
    pdf = pd.DataFrame(
        {
            "sample": [f"s{i}" for i in range(n_samples)],
            "aliquot": [f"a{i}" for i in range(n_samples)],
        }
    )
    return spark.createDataFrame(pdf)


_OCC_SCHEMA = T.StructType(
    [
        T.StructField("sample", T.StringType()),
        T.StructField("contig", T.StringType()),
        T.StructField("start", T.LongType()),
        T.StructField("end", T.LongType()),
        T.StructField("reference", T.StringType()),
        T.StructField("alternate", T.StringType()),
        T.StructField("mutationId", T.StringType()),
        T.StructField(
            "candidates",
            T.ArrayType(
                T.StructType(
                    [
                        T.StructField("gene", T.StringType()),
                        T.StructField("impact", T.StringType()),
                        T.StructField("sift", T.DoubleType()),
                        T.StructField("poly", T.DoubleType()),
                        T.StructField(
                            "consequences",
                            T.ArrayType(
                                T.StructType(
                                    [T.StructField("conseq", T.StringType())]
                                )
                            ),
                        ),
                    ]
                )
            ),
        ),
    ]
)


def _mutation_pool(g, n_pool, n_genes, max_candidates, skew):
    """Shared pool of annotated mutations (mutationId → candidates)."""
    alpha = 2.0 - min(skew, 4.0) * 0.15  # more skew ⇒ heavier candidate tail
    sizes = _zipf_sizes(g, n_pool, max_candidates, alpha=alpha)
    pool = []
    for i in range(n_pool):
        cands = []
        for _ in range(sizes[i]):
            n_cons = int(g.integers(1, 4))
            cands.append(
                {
                    "gene": f"g{int(g.integers(0, n_genes))}",
                    "impact": IMPACTS[int(g.integers(0, 4))],
                    "sift": round(float(g.random()), 3),
                    "poly": round(float(g.random()), 3),
                    "consequences": [
                        {"conseq": SO_TERMS[int(g.integers(0, len(SO_TERMS)))][0]}
                        for _ in range(n_cons)
                    ],
                }
            )
        pool.append(
            {
                "contig": f"chr{int(g.integers(1, 23))}",
                "start": int(g.integers(1, 10_000_000)),
                "end": int(g.integers(1, 10_000_000)),
                "reference": "ACGT"[int(g.integers(0, 4))],
                "alternate": "ACGT"[int(g.integers(0, 4))],
                "mutationId": f"MU{i}",
                "candidates": cands,
            }
        )
    return pool


def occurrences(
    spark: SparkSession,
    n_samples: int = 50,
    muts_per_sample: int = 40,
    n_genes: int = 300,
    max_candidates: int = 30,
    skew: float = 0.0,
    seed: int = 13,
) -> DataFrame:
    """BN₂: the two-level nested Occurrences relation (App. C.1.1)."""
    g = _rng(seed)
    pool = _mutation_pool(
        g, max(n_samples * muts_per_sample // 3, 10), n_genes,
        max_candidates, skew,
    )
    rows = []
    for i in range(n_samples):
        picks = g.choice(len(pool), size=muts_per_sample, replace=False)
        for j in picks:
            rows.append({"sample": f"s{i}", **pool[j]})
    return spark.createDataFrame(rows, schema=_OCC_SCHEMA)


def copy_number(
    spark: SparkSession, n_samples: int = 50, n_genes: int = 300, seed: int = 17
) -> DataFrame:
    """BF₂: per-aliquot, per-gene copy number (App. C.1.3)."""
    g = _rng(seed)
    ali = np.repeat([f"a{i}" for i in range(n_samples)], n_genes)
    gene = np.tile([f"g{j}" for j in range(n_genes)], n_samples)
    pdf = pd.DataFrame(
        {
            "aliquot": ali,
            "gene": gene,
            "cnum": g.integers(0, 6, len(ali)),
        }
    )
    return spark.createDataFrame(pdf)


def copy_number_g(
    spark: SparkSession, n_genes: int = 300, seed: int = 18
) -> DataFrame:
    """Per-gene copy number used by clinical queries C₂/C₃ (App. C.3)."""
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "gene": [f"g{j}" for j in range(n_genes)],
            "cnum": g.integers(0, 6, n_genes),
        }
    )
    return spark.createDataFrame(pdf)


_NET_SCHEMA = T.StructType(
    [
        T.StructField("nodeProtein", T.StringType()),
        T.StructField(
            "edges",
            T.ArrayType(
                T.StructType(
                    [
                        T.StructField("edgeProtein", T.StringType()),
                        T.StructField("distance", T.LongType()),
                    ]
                )
            ),
        ),
    ]
)


def network(
    spark: SparkSession, n_proteins: int = 150, seed: int = 19
) -> DataFrame:
    """BN₁: protein–protein interaction network (App. C.1.4)."""
    g = _rng(seed)
    sizes = _zipf_sizes(g, n_proteins, max_size=n_proteins // 2)
    rows = []
    for i in range(n_proteins):
        edges = [
            {
                "edgeProtein": f"p{int(g.integers(0, n_proteins))}",
                "distance": int(g.integers(1, 1000)),
            }
            for _ in range(sizes[i])
        ]
        rows.append({"nodeProtein": f"p{i}", "edges": edges})
    return spark.createDataFrame(rows, schema=_NET_SCHEMA)


def gene_expression(
    spark: SparkSession, n_samples: int = 50, n_genes: int = 300, seed: int = 23
) -> DataFrame:
    """BF₁: FPKM gene expression per aliquot (App. C.1.5)."""
    g = _rng(seed)
    ali = np.repeat([f"a{i}" for i in range(n_samples)], n_genes)
    gene = np.tile([f"g{j}" for j in range(n_genes)], n_samples)
    pdf = pd.DataFrame(
        {
            "aliquot": ali,
            "gene": gene,
            "fpkm": (g.random(len(ali)) * 100).round(3),
        }
    )
    return spark.createDataFrame(pdf)


def so_impact(spark: SparkSession) -> DataFrame:
    """BF₃: sequence-ontology consequence → quantitative score."""
    pdf = pd.DataFrame(SO_TERMS, columns=["conseq", "value"])
    return spark.createDataFrame(pdf)


def biomart(
    spark: SparkSession, n_genes: int = 300, n_proteins: int = 150, seed: int = 29
) -> DataFrame:
    """Gene → protein identifier map (App. C.1.6)."""
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "gene": [f"g{j}" for j in range(n_genes)],
            "protein": [f"p{int(g.integers(0, n_proteins))}" for _ in range(n_genes)],
        }
    )
    return spark.createDataFrame(pdf)


def maf(
    spark: SparkSession,
    n_rows: int = 2000,
    n_mutations: int = 600,
    n_samples: int = 50,
    seed: int = 31,
) -> DataFrame:
    """Flat somatic-mutation dump: samples share mutation ids (App. D)."""
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "sample": [f"s{int(g.integers(0, n_samples))}" for _ in range(n_rows)],
            "mutationId": [
                f"MU{int(g.integers(0, n_mutations))}" for _ in range(n_rows)
            ],
        }
    )
    return spark.createDataFrame(pdf)


def vep(
    spark: SparkSession,
    n_mutations: int = 600,
    n_genes: int = 300,
    max_candidates: int = 20,
    seed: int = 37,
) -> DataFrame:
    """Unique VEP annotations per mutation (nested, App. C.1.2 / D)."""
    g = _rng(seed)
    pool = _mutation_pool(g, n_mutations, n_genes, max_candidates, skew=0.0)
    rows = [{k: v for k, v in p.items()} for p in pool]
    schema = T.StructType([f for f in _OCC_SCHEMA.fields if f.name != "sample"])
    return spark.createDataFrame(rows, schema=schema)
