"""DataFrame-level PDX layout construction (the per-partition columnar
block format of the repro brief).

``vectors_to_blocks`` turns a DataFrame of ``(id: long, vec:
array<...>)`` rows into a DataFrame of PDX *block* rows::

    block_id: long, n: int, ids: array<long>,
    data: array<double>   -- D*n values, dimension-major (d0 of all n
                             vectors, then d1, ...),
    means: array<double>  -- per-dimension means of the block

Blocks are formed by ``id`` order (``row_number`` over id), so the
mapping is deterministic and round-trippable. The heavy lifting is an
``applyInPandas`` group transform — each group becomes exactly one
block row, transposed with NumPy inside the executor.

``transform_vectors`` applies a pruner's collection preprocessing
(ADSampling rotation / BSA PCA) as a ``mapInPandas`` transformation so
ADS/BSA blocks can be built in the transformed space, mirroring the
paper's index-build pipeline.
"""
from __future__ import annotations

from collections.abc import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.kernels import PDX_BLOCK_SIZE
from repro.core.layout import PDXBlock
from repro.core.pruners import Pruner

BLOCK_SCHEMA = (
    "block_id long, n int, ids array<long>, data array<double>, means array<double>"
)


def vectors_to_blocks(
    df: DataFrame, *, block_size: int = PDX_BLOCK_SIZE
) -> DataFrame:
    """Group vectors into PDX block rows (dimension-major within block)."""

    def make_block(key, pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values("id")
        mat = np.array(pdf["vec"].tolist(), dtype=np.float64)  # (n, D)
        dm = mat.T  # (D, n) dimension-major
        return pd.DataFrame(
            {
                "block_id": [int(key[0])],
                "n": [mat.shape[0]],
                "ids": [pdf["id"].to_numpy(dtype=np.int64).tolist()],
                "data": [dm.ravel().tolist()],
                "means": [dm.mean(axis=1).tolist()],
            }
        )

    w = Window.orderBy("id")
    with_block = df.withColumn(
        "block_id", ((F.row_number().over(w) - F.lit(1)) / F.lit(block_size)).cast("long")
    )
    return with_block.groupBy("block_id").applyInPandas(make_block, BLOCK_SCHEMA)


def transform_vectors(df: DataFrame, pruner: Pruner) -> DataFrame:
    """Apply ``pruner.transform_data`` to every vector (mapInPandas)."""

    def apply(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if len(pdf) == 0:
                continue
            mat = np.array(pdf["vec"].tolist(), dtype=np.float32)
            out = pruner.transform_data(mat)
            yield pd.DataFrame(
                {"id": pdf["id"].to_numpy(), "vec": list(map(list, out.astype(float)))}
            )

    return df.mapInPandas(apply, schema="id long, vec array<double>")


def rows_to_pdx_blocks(pdf: pd.DataFrame) -> list[PDXBlock]:
    """Reconstruct executor-side :class:`PDXBlock`s from block rows."""
    blocks = []
    for _, row in pdf.iterrows():
        n = int(row["n"])
        data = np.asarray(row["data"], dtype=np.float32)
        dim = len(data) // n
        blocks.append(
            PDXBlock(
                data=np.ascontiguousarray(data.reshape(dim, n)),
                ids=np.asarray(row["ids"], dtype=np.int64),
                means=np.asarray(row["means"], dtype=np.float32),
            )
        )
    return blocks
