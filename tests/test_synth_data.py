"""Synthetic data generators: determinism, schemas, skew shapes."""
import pytest
from pyspark.sql import functions as F

from repro import biomed_data as B
from repro import synth_data as S


def test_lineitem_deterministic(spark):
    a = S.lineitem(spark, sf=0.001, seed=7).collect()
    b = S.lineitem(spark, sf=0.001, seed=7).collect()
    assert a == b


def test_lineitem_seed_changes_data(spark):
    a = S.lineitem(spark, sf=0.001, seed=7).collect()
    b = S.lineitem(spark, sf=0.001, seed=8).collect()
    assert a != b


def test_scale_factor_controls_rows(spark):
    assert S.lineitem(spark, sf=0.002).count() == 12000
    assert S.orders(spark, sf=0.002).count() == 3000
    assert S.customer(spark, sf=0.002).count() == 300
    assert S.part(spark, sf=0.002).count() == 400


def test_nation_region_fixed(spark):
    assert S.nation(spark).count() == 25
    assert S.region(spark).count() == 5
    nk = S.nation(spark).select("n_regionkey").distinct().collect()
    assert {r["n_regionkey"] for r in nk} <= set(range(5))


def test_keys_reference_parents(spark):
    li = S.lineitem(spark, sf=0.002)
    orders = S.orders(spark, sf=0.002)
    max_ok = li.agg(F.max("l_orderkey")).collect()[0][0]
    assert max_ok <= orders.count()


def test_skew_increases_top_key_share(spark):
    def top_share(z):
        li = S.lineitem(spark, sf=0.002, skew=z)
        top = (
            li.groupBy("l_orderkey").count().orderBy(F.desc("count")).first()
        )
        return top["count"] / li.count()

    s0, s4 = top_share(0.0), top_share(4.0)
    assert s4 > 10 * s0


def test_skew_zero_matches_uniform(spark):
    a = S.lineitem(spark, sf=0.001, seed=3, skew=0.0).collect()
    b = S.lineitem(spark, sf=0.001, seed=3).collect()
    assert a == b


def test_wide_filler_attributes_present(spark):
    assert "o_comment" in S.orders(spark, sf=0.001).columns
    assert "c_comment" in S.customer(spark, sf=0.001).columns


def test_part_retailprice_positive(spark):
    mn = S.part(spark, sf=0.002).agg(F.min("p_retailprice")).collect()[0][0]
    assert mn > 0


# --- biomedical generators --------------------------------------------


def test_occurrences_schema_and_nesting(spark):
    occ = B.occurrences(spark, n_samples=5, muts_per_sample=6)
    row = occ.first().asDict(recursive=True)
    assert {"sample", "mutationId", "candidates"} <= set(row)
    cand = row["candidates"][0]
    assert {"gene", "impact", "sift", "poly", "consequences"} == set(cand)
    assert {"conseq"} == set(cand["consequences"][0])


def test_occurrences_shared_mutation_pool(spark):
    occ = B.occurrences(spark, n_samples=10, muts_per_sample=20)
    total = occ.count()
    distinct = occ.select("mutationId").distinct().count()
    assert distinct < total  # samples share mutations (App. D premise)


def test_candidate_sizes_are_skewed(spark):
    occ = B.occurrences(spark, n_samples=10, muts_per_sample=20, skew=3.0)
    sizes = occ.select(F.size("candidates").alias("n"))
    mx = sizes.agg(F.max("n")).collect()[0][0]
    med = sizes.approxQuantile("n", [0.5], 0.01)[0]
    assert mx >= 2.5 * med  # heavy tail (max_candidates caps the max)


def test_network_degrees(spark):
    net = B.network(spark, n_proteins=30)
    assert net.count() == 30
    assert net.select(F.size("edges").alias("d")).agg(F.min("d")).collect()[0][0] >= 1


def test_copy_number_covers_all_pairs(spark):
    cn = B.copy_number(spark, n_samples=4, n_genes=10)
    assert cn.count() == 40
    assert cn.select("aliquot").distinct().count() == 4


def test_so_impact_scores_in_unit_interval(spark):
    rows = B.so_impact(spark).collect()
    assert all(0 < r["value"] <= 1 for r in rows)


def test_maf_vep_join_keys_align(spark):
    maf = B.maf(spark, n_rows=200, n_mutations=50)
    vep = B.vep(spark, n_mutations=50)
    joined = maf.join(vep, "mutationId")
    assert joined.count() == maf.count()  # every MAF row annotated


def test_zipf_keys_generator(spark):
    df = S.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5)
    top = df.groupBy("k").count().orderBy(F.desc("count")).first()
    assert top["count"] > 5000 / 100 * 3
