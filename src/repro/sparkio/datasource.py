"""Python DataSourceV2 exposing APAX/AMAX stores to Catalyst.

Registers format ``"lsmcol"``: a stored dataset (directory of partition
stores written by :mod:`repro.sparkio.ingest`) becomes a DataFrame with
one Spark input partition per LSM data partition.  The *fields* option
projects document paths into typed top-level columns — only those
columns' pages are read (AMAX) — and supported pushed filters prune AMAX
mega leaves via Page-0 zone maps before Spark re-applies them.

    spark.dataSource.register(LsmColumnarDataSource)
    df = (spark.read.format("lsmcol")
          .option("path", "/data/cell_amax")
          .option("fields", "caller:bigint,duration:bigint")
          .load())

Why not a JVM FileFormat: the contribution is the storage layout + typed
columnar access; PySpark 4.x's Python DataSource API is the supported
extension point with the same planner-visible surface (partitions,
filter pushdown), without a JVM build (DESIGN §5.4).
"""
from __future__ import annotations

import json
from dataclasses import dataclass
from typing import Iterator, Optional

from pyspark.sql.datasource import (
    DataSource,
    DataSourceReader,
    EqualTo,
    GreaterThan,
    GreaterThanOrEqual,
    InputPartition,
    LessThan,
    LessThanOrEqual,
)
from pyspark.sql.types import (
    BooleanType,
    DoubleType,
    LongType,
    StringType,
    StructField,
    StructType,
)

_TYPES = {
    "bigint": LongType(),
    "double": DoubleType(),
    "string": StringType(),
    "boolean": BooleanType(),
}


def _parse_fields(spec: str) -> list[tuple[str, str, str]]:
    """'name=path:type,...' (name defaults to the path) -> field specs."""
    out = []
    for part in spec.split(","):
        part = part.strip()
        path_type, _, ty = part.rpartition(":")
        if "=" in path_type:
            name, path = path_type.split("=", 1)
        else:
            name, path = path_type.replace(".", "_").replace("[*]", ""), path_type
        out.append((name, path, ty))
    return out


@dataclass
class _Part(InputPartition):
    store_path: str


class LsmColumnarReader(DataSourceReader):
    def __init__(self, schema: StructType, options: dict) -> None:
        self.schema_ = schema
        self.path = options["path"]
        self.fields = _parse_fields(options["fields"])
        self.pushed: list[tuple[str, str, object]] = []

    def pushFilters(self, filters):  # noqa: N802 (Spark API name)
        """Capture zone-map-usable filters; return ALL filters as
        unsupported so Spark re-applies them (pruning may pass false
        positives within a surviving mega leaf)."""
        name_to_path = {n: p for n, p, _t in self.fields}
        for f in filters:
            col = f.attribute[0] if hasattr(f, "attribute") else None
            path = name_to_path.get(col)
            if path is None:
                continue
            if isinstance(f, (GreaterThan, GreaterThanOrEqual)):
                self.pushed.append((path, ">=", f.value))
            elif isinstance(f, (LessThan, LessThanOrEqual)):
                self.pushed.append((path, "<=", f.value))
            elif isinstance(f, EqualTo):
                self.pushed.append((path, "between", (f.value, f.value)))
        return filters

    def partitions(self):
        import os

        return [
            _Part(os.path.join(self.path, n))
            for n in sorted(os.listdir(self.path))
            if n.startswith("part_")
        ]

    def read(self, partition: _Part) -> Iterator[tuple]:
        from ..dremel.assemble import MISSING
        from ..lsm.store import LSMStore
        from ..query.sources import env_stream
        from ..storage.pagefile import BufferCache

        store = LSMStore.open(partition.store_path, BufferCache())
        bindings = {f"v{i}": p for i, (_n, p, _t) in enumerate(self.fields)}
        zone = self.pushed[0] if self.pushed else None
        for tup in env_stream([store], bindings, zone):
            yield tuple(None if v is MISSING else v for v in tup)


class LsmColumnarDataSource(DataSource):
    @classmethod
    def name(cls) -> str:
        return "lsmcol"

    def schema(self) -> StructType:
        fields = _parse_fields(self.options["fields"])
        return StructType(
            [StructField(n, _TYPES[t], True) for n, _p, t in fields]
        )

    def reader(self, schema: StructType) -> LsmColumnarReader:
        return LsmColumnarReader(schema, dict(self.options))
