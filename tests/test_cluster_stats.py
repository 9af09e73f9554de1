"""Tests for repro.core.cluster_stats, oracle-checked against DuckDB."""
import numpy as np
import pytest

from repro.core.cluster_stats import Population, cluster_stats_df, kg_accuracy
from repro.kg.generator import movie_like, nell_like
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def nell_kg():
    return nell_like()


class TestClusterStatsDf:
    def test_oracle_equivalence(self, spark, nell_kg):
        """The Spark groupBy matches the same SQL evaluated by DuckDB."""
        pdf = nell_kg.to_pandas()
        df = spark.createDataFrame(pdf)
        got = cluster_stats_df(df)
        assert_equivalent(
            got,
            "SELECT subject, COUNT(*) AS size, CAST(SUM(label) AS BIGINT) AS tau "
            "FROM kg GROUP BY subject",
            kg=pdf,
        )

    def test_matches_generator_arrays(self, spark, nell_kg):
        pop = Population.from_kg(nell_kg.to_spark(spark))
        assert (pop.sizes == nell_kg.sizes).all()
        assert (pop.taus == nell_kg.taus).all()

    def test_kg_accuracy_oracle(self, spark, nell_kg):
        pdf = nell_kg.to_pandas()
        acc = kg_accuracy(spark.createDataFrame(pdf))
        assert acc == pytest.approx(pdf["label"].mean(), abs=1e-12)


class TestPopulation:
    def test_from_synthetic_matches_from_kg(self, spark):
        kg = movie_like(sf=0.001)
        a = Population.from_synthetic(kg)
        b = Population.from_kg(kg.to_spark(spark))
        assert (a.sizes == b.sizes).all()
        assert (a.taus == b.taus).all()
        assert (a.subjects == b.subjects).all()

    def test_summary_properties(self):
        pop = Population(
            subjects=np.array([0, 1, 2]),
            sizes=np.array([2, 3, 5]),
            taus=np.array([1, 3, 5]),
        )
        assert pop.n_clusters == 3
        assert pop.n_triples == 10
        assert pop.mu == pytest.approx(0.9)
        assert np.allclose(pop.cluster_accuracies, [0.5, 1.0, 1.0])
