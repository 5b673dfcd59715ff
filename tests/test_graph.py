"""Unit tests for core.graph: beta/gamma scores, top-K pruning, edge sets."""
from __future__ import annotations

import pytest
from pyspark.sql import functions as F

from tests import reference
from repro.core import DEFAULT_CONFIG
from repro.core.blocking import purge_blocks, token_block_index
from repro.core.graph import beta_scores, gamma_scores, top_k_directed
from repro.core.relations import top_in_neighbors, top_n_neighbors
from repro.core.tokens import literal_tokens
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def micro_beta_inputs(micro_pair):
    t1 = literal_tokens(micro_pair.triples1).cache()
    t2 = literal_tokens(micro_pair.triples2).cache()
    kept, _ = purge_blocks(token_block_index(t1, t2))
    kept = kept.cache()
    return t1, t2, kept


class TestBetaScores:
    def test_oracle_equivalence(self, micro_beta_inputs):
        t1, t2, kept = micro_beta_inputs
        beta = beta_scores(t1, t2, kept)
        assert_equivalent(
            beta.select("eid1", "eid2", F.round("beta", 9).alias("beta")),
            """
            SELECT t1.eid AS eid1, t2.eid AS eid2,
                   round(sum(k.weight), 9) AS beta
            FROM t1 JOIN k USING (token) JOIN t2 USING (token)
            GROUP BY t1.eid, t2.eid
            """,
            t1=t1,
            t2=t2,
            k=kept.select("token", "weight"),
        )

    def test_matches_reference_value_sim(self, micro_pair, micro_beta_inputs):
        t1, t2, kept = micro_beta_inputs
        purged = {
            r.token
            for r in token_block_index(t1, t2)
            .join(kept.select("token"), "token", "left_anti")
            .collect()
        }
        tok1 = reference.tokens_of(micro_pair.pdf1)
        tok2 = reference.tokens_of(micro_pair.pdf2)
        ef1 = reference.entity_frequency(tok1)
        ef2 = reference.entity_frequency(tok2)
        beta = {
            (r.eid1, r.eid2): r.beta
            for r in beta_scores(t1, t2, kept).collect()
        }
        # spot-check all ground-truth pairs plus some non-pairs
        for e1, e2 in zip(micro_pair.gt_pdf.eid1, micro_pair.gt_pdf.eid2):
            want = reference.value_sim(
                tok1.get(int(e1), set()), tok2.get(int(e2), set()), ef1, ef2, purged
            )
            got = beta.get((int(e1), int(e2)), 0.0)
            assert got == pytest.approx(want, abs=1e-9)

    def test_beta_positive(self, micro_beta_inputs):
        t1, t2, kept = micro_beta_inputs
        assert (
            beta_scores(t1, t2, kept).filter(F.col("beta") <= 0).count() == 0
        )

    def test_symmetric_in_inputs(self, micro_beta_inputs):
        """valueSim is symmetric: swapping the KBs transposes the matrix."""
        t1, t2, kept = micro_beta_inputs
        a = {
            (r.eid1, r.eid2, round(r.beta, 9))
            for r in beta_scores(t1, t2, kept).collect()
        }
        kept_sw = kept.withColumnRenamed("ef1", "ef2x").withColumnRenamed(
            "ef2", "ef1"
        ).withColumnRenamed("ef2x", "ef2")
        # beta_scores(t2, t1, ...) labels the t2 entity as eid1, so the
        # transposed tuple is (r.eid2, r.eid1).
        b = {
            (r.eid2, r.eid1, round(r.beta, 9))
            for r in beta_scores(t2, t1, kept_sw).collect()
        }
        assert a == b


class TestTopKDirected:
    def test_keeps_k_best(self, spark, micro_beta_inputs):
        t1, t2, kept = micro_beta_inputs
        beta = beta_scores(t1, t2, kept)
        top = top_k_directed(beta, "eid1", "eid2", "beta", 3)
        counts = top.groupBy("eid1").count().agg(F.max("count")).collect()[0][0]
        assert counts <= 3

    def test_rank_one_is_max(self, micro_beta_inputs):
        t1, t2, kept = micro_beta_inputs
        beta = beta_scores(t1, t2, kept).cache()
        top1 = top_k_directed(beta, "eid1", "eid2", "beta", 1)
        maxes = beta.groupBy("eid1").agg(F.max("beta").alias("mx"))
        joined = top1.join(maxes, "eid1")
        assert joined.filter(F.col("beta") != F.col("mx")).count() == 0

    def test_ranks_are_dense_from_one(self, micro_beta_inputs):
        t1, t2, kept = micro_beta_inputs
        beta = beta_scores(t1, t2, kept)
        top = top_k_directed(beta, "eid1", "eid2", "beta", 5)
        mins = top.groupBy("eid1").agg(
            F.min("rank").alias("lo"), F.max("rank").alias("hi"), F.count("*").alias("n")
        )
        assert mins.filter(F.col("lo") != 1).count() == 0
        assert mins.filter(F.col("hi") != F.col("n")).count() == 0

    def test_deterministic_tie_break(self, spark):
        import pandas as pd

        df = spark.createDataFrame(
            pd.DataFrame(
                {"eid1": [1, 1, 1], "eid2": [30, 10, 20], "beta": [1.0, 1.0, 1.0]}
            )
        )
        top = top_k_directed(df, "eid1", "eid2", "beta", 2).orderBy("rank")
        assert [r.eid2 for r in top.collect()] == [10, 20]


class TestGammaScores:
    def test_matches_reference(self, micro_pair, micro_graph):
        # reference gamma from the same retained beta edges
        retained = (
            micro_graph.beta_out1.select("eid1", "eid2", "beta")
            .union(micro_graph.beta_out2.select("eid1", "eid2", "beta"))
            .distinct()
        )
        edges = [(r.eid1, r.eid2, r.beta) for r in retained.collect()]
        topin1 = reference.top_in_neighbors(
            reference.top_n_neighbors(micro_pair.pdf1, DEFAULT_CONFIG.N)
        )
        topin2 = reference.top_in_neighbors(
            reference.top_n_neighbors(micro_pair.pdf2, DEFAULT_CONFIG.N)
        )
        want = reference.gamma_scores(edges, topin1, topin2)

        tin1 = top_in_neighbors(top_n_neighbors(micro_pair.triples1, DEFAULT_CONFIG.N))
        tin2 = top_in_neighbors(top_n_neighbors(micro_pair.triples2, DEFAULT_CONFIG.N))
        got = {
            (r.eid1, r.eid2): r.gamma
            for r in gamma_scores(retained, tin1, tin2).collect()
        }
        assert set(got) == set(want)
        for k, v in want.items():
            assert got[k] == pytest.approx(v, abs=1e-9)

    def test_gamma_oracle_equivalence(self, spark, micro_graph, micro_pair):
        retained = (
            micro_graph.beta_out1.select("eid1", "eid2", "beta")
            .union(micro_graph.beta_out2.select("eid1", "eid2", "beta"))
            .distinct()
        )
        tin1 = top_in_neighbors(top_n_neighbors(micro_pair.triples1, DEFAULT_CONFIG.N))
        tin2 = top_in_neighbors(top_n_neighbors(micro_pair.triples2, DEFAULT_CONFIG.N))
        got = gamma_scores(retained, tin1, tin2).select(
            "eid1", "eid2", F.round("gamma", 9).alias("gamma")
        )
        assert_equivalent(
            got,
            """
            SELECT i1.in_neighbor AS eid1, i2.in_neighbor AS eid2,
                   round(sum(e.beta), 9) AS gamma
            FROM e
            JOIN i1 ON i1.eid = e.eid1
            JOIN i2 ON i2.eid = e.eid2
            GROUP BY i1.in_neighbor, i2.in_neighbor
            """,
            e=retained,
            i1=tin1,
            i2=tin2,
        )


class TestGraphStructure:
    def test_alpha_pairs_unique_names(self, micro_graph, micro_pair):
        # every alpha edge must be a 1x1 name block: verified by recount
        from repro.core.names import alpha_edges, entity_names

        n1 = entity_names(micro_pair.triples1, micro_graph.name_attrs1)
        n2 = entity_names(micro_pair.triples2, micro_graph.name_attrs2)
        expect = {(r.eid1, r.eid2) for r in alpha_edges(n1, n2).collect()}
        got = {(r.eid1, r.eid2) for r in micro_graph.alpha.collect()}
        assert got == expect

    def test_beta_out_capped_by_k(self, micro_graph):
        for df, node in ((micro_graph.beta_out1, "eid1"), (micro_graph.beta_out2, "eid2")):
            worst = df.groupBy(node).count().agg(F.max("count")).collect()[0][0]
            assert worst <= DEFAULT_CONFIG.K

    def test_gamma_out_capped_by_k(self, micro_graph):
        for df, node in ((micro_graph.gamma_out1, "eid1"), (micro_graph.gamma_out2, "eid2")):
            worst = df.groupBy(node).count().agg(F.max("count")).collect()[0][0]
            assert worst <= DEFAULT_CONFIG.K

    def test_directed_edges_superset_of_alpha(self, micro_graph):
        a = micro_graph.alpha.select("eid1", "eid2")
        assert a.join(micro_graph.directed_from1(), ["eid1", "eid2"], "left_anti").count() == 0
        assert a.join(micro_graph.directed_from2(), ["eid1", "eid2"], "left_anti").count() == 0

    def test_counts_recorded(self, micro_graph, micro_pair):
        assert micro_graph.n1 == micro_pair.triples1.select("eid").distinct().count()
        assert micro_graph.n2 == micro_pair.triples2.select("eid").distinct().count()
