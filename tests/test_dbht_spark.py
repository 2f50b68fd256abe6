"""DBHT Spark SQL steps: every aggregation oracle-checked against DuckDB,
and full assignments identical to the driver reference."""
import numpy as np
import pandas as pd
import pytest

from repro.core.dbht import assign_vertices, tmfg_apsp
from repro.core.linkage import hac
from repro.core.tmfg import tmfg
from repro.oracle import assert_equivalent
from repro.spark.apsp_spark import apsp_df
from repro.spark.dbht_spark import (assign_vertices_spark,
                                    bubble_denominators, chi_prime_scores,
                                    chi_scores, lbar_scores, membership_df,
                                    subgroup_linkages_spark)
from repro.spark.similarity import sim_df_from_matrix


@pytest.fixture(scope="module")
def case():
    rng = np.random.default_rng(0)
    n = 40
    S = rng.random((n, n))
    S = (S + S.T) / 2
    np.fill_diagonal(S, 1.0)
    D = np.sqrt(2 * (1 - np.clip(S, -1, 1)))
    t = tmfg(S, prefix=4)
    dist = tmfg_apsp(D, t)
    return S, D, t, dist


@pytest.fixture(scope="module")
def relations(spark, case):
    S, D, t, dist = case
    mem = membership_df(spark, t)
    sim = sim_df_from_matrix(spark, S)
    mem_pdf = mem.toPandas()
    sim_pdf = sim.toPandas()
    return mem, sim, mem_pdf, sim_pdf


class TestOracleSQL:
    def test_chi_scores(self, spark, relations):
        mem, sim, mem_pdf, sim_pdf = relations
        got = chi_scores(mem, sim)
        assert_equivalent(
            got,
            """
            SELECT m1.bubble AS bubble, m2.v AS v, SUM(s.w) AS chi
            FROM mem m1
            JOIN mem m2 ON m1.bubble = m2.bubble AND m1.v <> m2.v
            JOIN sim s ON m1.v = s.i AND m2.v = s.j
            GROUP BY 1, 2
            """,
            mem=mem_pdf,
            sim=sim_pdf,
        )

    def test_bubble_denominators(self, spark, relations):
        mem, sim, mem_pdf, sim_pdf = relations
        got = bubble_denominators(mem, sim)
        assert_equivalent(
            got,
            """
            SELECT m1.bubble AS bubble, SUM(s.w) AS den
            FROM mem m1
            JOIN mem m2 ON m1.bubble = m2.bubble AND m1.v < m2.v
            JOIN sim s ON m1.v = s.i AND m2.v = s.j
            GROUP BY 1
            """,
            mem=mem_pdf,
            sim=sim_pdf,
        )

    def test_chi_prime_scores(self, spark, relations):
        mem, sim, mem_pdf, sim_pdf = relations
        got = chi_prime_scores(mem, sim)
        assert_equivalent(
            got,
            """
            WITH num AS (
                SELECT m1.bubble AS bubble, m2.v AS v, SUM(s.w) AS num
                FROM mem m1
                JOIN mem m2 ON m1.bubble = m2.bubble AND m1.v <> m2.v
                JOIN sim s ON m1.v = s.i AND m2.v = s.j
                GROUP BY 1, 2
            ), den AS (
                SELECT m1.bubble AS bubble, SUM(s.w) AS den
                FROM mem m1
                JOIN mem m2 ON m1.bubble = m2.bubble AND m1.v < m2.v
                JOIN sim s ON m1.v = s.i AND m2.v = s.j
                GROUP BY 1
            )
            SELECT num.bubble AS bubble, num.v AS v, num.num / den.den AS chi2
            FROM num JOIN den ON num.bubble = den.bubble
            """,
            mem=mem_pdf,
            sim=sim_pdf,
        )

    def test_lbar_scores(self, spark, case):
        S, D, t, dist = case
        n = t.n
        rng = np.random.default_rng(1)
        cand_pdf = pd.DataFrame({
            "v": rng.integers(0, n, 12),
            "bubble": rng.integers(0, 3, 12),
        }).drop_duplicates()
        vb0_pdf = pd.DataFrame({
            "bubble": rng.integers(0, 3, 10),
            "u": rng.integers(0, n, 10),
        }).drop_duplicates()
        ii, jj = np.meshgrid(np.arange(n), np.arange(n), indexing="ij")
        dist_pdf = pd.DataFrame({
            "src": ii.ravel(), "dst": jj.ravel(), "dist": dist.ravel()
        })
        cand = spark.createDataFrame(cand_pdf, schema="v long, bubble long")
        vb0 = spark.createDataFrame(vb0_pdf, schema="bubble long, u long")
        w = D[t.edges[:, 0], t.edges[:, 1]]
        ddf = apsp_df(spark, n, t.edges, w)
        got = lbar_scores(cand, vb0, ddf)
        assert_equivalent(
            got,
            """
            SELECT c.v AS v, c.bubble AS bubble, AVG(d.dist) AS lbar
            FROM cand c
            JOIN vb0 b ON c.bubble = b.bubble
            JOIN dist d ON b.u = d.src AND c.v = d.dst
            GROUP BY 1, 2
            """,
            cand=cand_pdf,
            vb0=vb0_pdf,
            dist=dist_pdf,
        )


class TestAssignmentEquivalence:
    @pytest.mark.parametrize("seed,prefix", [(0, 1), (1, 4), (2, 10)])
    def test_matches_driver(self, spark, seed, prefix):
        rng = np.random.default_rng(seed)
        n = 50
        S = rng.random((n, n))
        S = (S + S.T) / 2
        np.fill_diagonal(S, 1.0)
        D = np.sqrt(2 * (1 - np.clip(S, -1, 1)))
        t = tmfg(S, prefix=prefix)
        dist = tmfg_apsp(D, t)
        ref = assign_vertices(S, t, dist)
        sim = sim_df_from_matrix(spark, S)
        w = D[t.edges[:, 0], t.edges[:, 1]]
        ddf = apsp_df(spark, n, t.edges, w)
        got = assign_vertices_spark(spark, S, t, dist, sim, ddf)
        assert np.array_equal(got.group, ref.group)
        assert np.array_equal(got.bubble, ref.bubble)
        assert np.array_equal(got.converging, ref.converging)


class TestSubgroupLinkage:
    def test_matches_driver_hac(self, spark, case):
        S, D, t, dist = case
        a = assign_vertices(S, t, dist)
        got = subgroup_linkages_spark(spark, a, dist)
        for g in np.unique(a.group):
            for q in np.unique(a.bubble[a.group == g]):
                members = np.flatnonzero((a.group == g) & (a.bubble == q))
                if len(members) < 2:
                    assert (int(g), int(q)) not in got
                    continue
                Z = hac(dist[np.ix_(members, members)], "complete")
                assert np.allclose(got[(int(g), int(q))], Z)
