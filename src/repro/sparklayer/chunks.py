"""Chunked DataFrame representation of scientific fields.

A chunk row is ``(dataset, field, chunk_id, dims, dtype, values)`` where
``values`` is the raw little-endian buffer of a C-contiguous array of shape
``dims``. Chunks are slabs along axis 0, the same way an MPI rank holds a
contiguous sub-domain of a snapshot in the paper's parallel-HDF5 setup.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

__all__ = [
    "CHUNK_SCHEMA",
    "array_to_chunks",
    "chunk_rows",
    "chunk_to_array",
    "chunks_to_arrays",
]

CHUNK_SCHEMA = T.StructType(
    [
        T.StructField("dataset", T.StringType(), False),
        T.StructField("field", T.StringType(), False),
        T.StructField("chunk_id", T.IntegerType(), False),
        T.StructField("dims", T.ArrayType(T.IntegerType()), False),
        T.StructField("dtype", T.StringType(), False),
        T.StructField("values", T.BinaryType(), False),
    ]
)


def chunk_rows(dataset: str, field: str, arr: np.ndarray, n_chunks: int) -> list[dict]:
    """Split ``arr`` into ≤ ``n_chunks`` axis-0 slabs → plain row dicts."""
    arr = np.ascontiguousarray(arr)
    n0 = arr.shape[0]
    n_chunks = max(1, min(n_chunks, n0))
    bounds = np.linspace(0, n0, n_chunks + 1).astype(int)
    rows = []
    for cid, (a, b) in enumerate(zip(bounds[:-1], bounds[1:])):
        if b <= a:
            continue
        slab = np.ascontiguousarray(arr[a:b])
        rows.append(
            {
                "dataset": dataset,
                "field": field,
                "chunk_id": cid,
                "dims": [int(x) for x in slab.shape],
                "dtype": str(slab.dtype),
                "values": slab.tobytes(),
            }
        )
    return rows


def array_to_chunks(
    spark: SparkSession,
    dataset: str,
    field: str,
    arr: np.ndarray,
    n_chunks: int = 4,
) -> DataFrame:
    """One field → chunk DataFrame (see module docstring)."""
    rows = chunk_rows(dataset, field, arr, n_chunks)
    return spark.createDataFrame(pd.DataFrame(rows), schema=CHUNK_SCHEMA)


def chunk_to_array(row) -> np.ndarray:
    """Row (Row or dict-like) → numpy array."""
    return np.frombuffer(row["values"], dtype=np.dtype(row["dtype"])).reshape(
        tuple(row["dims"])
    )


def chunks_to_arrays(df: DataFrame) -> dict[tuple[str, str, int], np.ndarray]:
    """Collect a chunk DataFrame → {(dataset, field, chunk_id): array}."""
    return {
        (r["dataset"], r["field"], int(r["chunk_id"])): chunk_to_array(r)
        for r in df.collect()
    }
