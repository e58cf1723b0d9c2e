"""Partition specs with Iceberg-style hidden-partitioning transforms.

A :class:`PartitionSpec` maps source columns to derived partition columns via
a transform (``identity`` or ``month``). The derived columns are materialized
only for routing rows into Hive-style ``name=value`` directories; the source
columns stay in the data files, so readers never see a schema change —
mirroring Iceberg's hidden partitioning.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

_TRANSFORMS = ("identity", "month")


@dataclass(frozen=True)
class PartitionField:
    """One partition dimension: ``transform(source)`` exposed as ``name``."""

    source: str
    transform: str = "identity"
    name: str = ""

    def __post_init__(self) -> None:
        if self.transform not in _TRANSFORMS:
            raise ValueError(
                f"unknown transform {self.transform!r}; supported: {_TRANSFORMS}"
            )
        if not self.name:
            default = (
                self.source
                if self.transform == "identity"
                else f"{self.source}_{self.transform}"
            )
            object.__setattr__(self, "name", default)

    def expr(self) -> Column:
        """Spark expression computing the partition value for each row."""
        col = F.col(self.source)
        if self.transform == "identity":
            return col.cast("string")
        # month: 'yyyy-MM' bucket of a date/timestamp column.
        return F.date_format(col, "yyyy-MM")


@dataclass(frozen=True)
class PartitionSpec:
    """An ordered list of partition fields; empty means unpartitioned."""

    fields: tuple[PartitionField, ...] = field(default=())

    def __post_init__(self) -> None:
        # Accept lists for ergonomic call sites; store a hashable tuple.
        if not isinstance(self.fields, tuple):
            object.__setattr__(self, "fields", tuple(self.fields))

    @staticmethod
    def unpartitioned() -> "PartitionSpec":
        return PartitionSpec(())

    @staticmethod
    def monthly(source: str, name: str = "") -> "PartitionSpec":
        """Convenience for the paper's LINEITEM-by-SHIPDATE-month layout."""
        return PartitionSpec((PartitionField(source, "month", name),))

    @staticmethod
    def identity(*sources: str) -> "PartitionSpec":
        return PartitionSpec(tuple(PartitionField(s, "identity") for s in sources))

    @property
    def is_partitioned(self) -> bool:
        return bool(self.fields)

    @property
    def names(self) -> list[str]:
        return [f.name for f in self.fields]

    def apply(self, df: DataFrame) -> DataFrame:
        """Return ``df`` with the derived partition columns appended."""
        for f in self.fields:
            df = df.withColumn(f.name, f.expr())
        return df

    def partition_path(self, values: dict[str, str]) -> str:
        """Hive-style relative path (``a=1/b=2``) for a partition tuple."""
        return "/".join(f"{f.name}={values[f.name]}" for f in self.fields)

    def to_dict(self) -> list[dict[str, str]]:
        return [
            {"source": f.source, "transform": f.transform, "name": f.name}
            for f in self.fields
        ]

    @staticmethod
    def from_dict(raw: list[dict[str, str]]) -> "PartitionSpec":
        return PartitionSpec(
            tuple(
                PartitionField(r["source"], r["transform"], r["name"]) for r in raw
            )
        )
