"""Shared helpers for iterative DataFrame kernels."""
from __future__ import annotations

from pyspark.sql import DataFrame


def iterate_checkpoint(df: DataFrame) -> DataFrame:
    """Cut lineage between supersteps.

    Every Pregel-style kernel loops `join → aggregate → compare`; without a
    checkpoint the plan doubles each round and Catalyst analysis time blows
    up. ``localCheckpoint(eager=True)`` materializes to executor storage —
    fine for a single-host session, and much cheaper than a reliable
    checkpoint to disk.
    """
    return df.localCheckpoint(eager=True)
