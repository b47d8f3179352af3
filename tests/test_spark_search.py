"""The Spark PDX KNN operator, checked against the DuckDB oracle.

Every query-result test goes through ``repro.oracle.assert_equivalent``:
the same KNN is expressed as plain SQL over a wide (d0…dD−1) table and
run on DuckDB; sorted rows must match the Spark operator's output.
"""
import numpy as np
import pytest
from pyspark.sql import functions as F

from _util import assert_same_topk

from repro import vecdata
from repro.core.pruners import ADSampling, PDXBond
from repro.oracle import assert_equivalent
from repro.spark.layout_ops import transform_vectors, vectors_to_blocks
from repro.spark.search_ops import knn

K = 10


@pytest.fixture(scope="module")
def ds():
    return vecdata.generate("nytimes16", sf=0.001, n_queries=6, seed=7)


@pytest.fixture(scope="module")
def blocks(spark, ds):
    df = vecdata.to_spark(spark, ds.data)
    return vectors_to_blocks(df, block_size=64).repartition(4).cache()


def test_knn_matches_duckdb_oracle(spark, ds, blocks):
    """Exact linear-scan KNN vs the same query in SQL on DuckDB."""
    wide = vecdata.to_pandas_wide(ds.data)
    for qi in range(3):
        got = (
            knn(blocks, ds.queries[qi], K)
            .where(F.col("qid") == 0)
            .select("id", F.round("dist", 4).alias("dist"))
        )
        inner = vecdata.knn_sql(ds.queries[qi], K, table="vecs", alias="exact_dist")
        sql = f"SELECT id, ROUND(exact_dist, 4) AS dist FROM ({inner}) t"
        assert_equivalent(got, sql, vecs=wide)


def test_knn_bond_matches_ground_truth(ds, blocks):
    gt_ids, gt_d = vecdata.ground_truth(ds.data, ds.queries, K)
    bond = PDXBond(ds.dim, order="means")
    out = knn(blocks, ds.queries, K, bond).toPandas()
    for qi in range(len(ds.queries)):
        rows = out[out["qid"] == qi].sort_values(["dist", "id"])
        assert_same_topk(
            rows["id"].to_numpy(), rows["dist"].to_numpy(), gt_ids[qi], gt_d[qi]
        )


def test_knn_multiquery_shape(ds, blocks):
    out = knn(blocks, ds.queries, K).toPandas()
    assert set(out["qid"].unique()) == set(range(len(ds.queries)))
    assert (out.groupby("qid").size() == K).all()


def test_knn_ads_recall_on_spark(spark, ds):
    ads = ADSampling(ds.dim, seed=2)
    df = vecdata.to_spark(spark, ds.data)
    tblocks = vectors_to_blocks(transform_vectors(df, ads), block_size=64).repartition(3)
    gt_ids, _ = vecdata.ground_truth(ds.data, ds.queries, K)
    out = knn(tblocks, ds.queries, K, ads).toPandas()
    found = np.stack(
        [
            out[out["qid"] == qi].sort_values(["dist", "id"])["id"].to_numpy()
            for qi in range(len(ds.queries))
        ]
    )
    assert vecdata.recall_at_k(found, gt_ids) >= 0.9


def test_knn_exact_across_partitionings(spark, ds):
    """Partition count must not change the exact result (per-partition
    thresholds prune only partition-local losers)."""
    df = vecdata.to_spark(spark, ds.data)
    gt_ids, gt_d = vecdata.ground_truth(ds.data, ds.queries[:2], K)
    for parts in (1, 7):
        blocks = vectors_to_blocks(df, block_size=64).repartition(parts)
        out = knn(blocks, ds.queries[:2], K, PDXBond(ds.dim)).toPandas()
        for qi in range(2):
            rows = out[out["qid"] == qi].sort_values(["dist", "id"])
            assert_same_topk(
                rows["id"].to_numpy(), rows["dist"].to_numpy(), gt_ids[qi], gt_d[qi]
            )


def test_knn_single_query_1d_input(ds, blocks):
    out = knn(blocks, ds.queries[0], 5).toPandas()
    assert len(out) == 5
    assert (out["qid"] == 0).all()
