"""OpenHouse-lite: a control-plane catalog of databases and tables.

Layout on disk:

```
<root>/
  <database>/db.json          # tenant config: namespace quota
  <database>/<table>/...      # LstTable directories
```

A *database* groups the tables of one tenant and carries an HDFS-style
namespace quota (max filesystem objects). AutoComp's production weight
policy (§7) reads ``used_quota / total_quota`` from here, exactly as the
LinkedIn deployment reads it from OpenHouse/HDFS.
"""
from __future__ import annotations

import json
import os
import time
from dataclasses import dataclass

from repro.lst.errors import TableNotFoundError
from repro.lst.spec import PartitionSpec
from repro.lst.table import LstTable

DEFAULT_QUOTA = 100_000


@dataclass
class Database:
    """One tenant namespace with an object-count quota."""

    name: str
    path: str
    total_quota: int

    def tables(self) -> list[str]:
        return sorted(
            d
            for d in os.listdir(self.path)
            if os.path.isfile(os.path.join(self.path, d, "table.json"))
        )

    def used_quota(self, catalog: "Catalog") -> int:
        return sum(
            catalog.load_table(self.name, t).metadata_object_count()
            for t in self.tables()
        )


class Catalog:
    """Filesystem-backed catalog; every operation re-reads state (stateless
    control plane, like OpenHouse's reconciliation model)."""

    def __init__(self, root: str):
        self.root = root
        os.makedirs(root, exist_ok=True)

    # ------------------------------------------------------------ databases
    def create_database(
        self, name: str, *, total_quota: int = DEFAULT_QUOTA
    ) -> Database:
        path = os.path.join(self.root, name)
        os.makedirs(path, exist_ok=True)
        with open(os.path.join(path, "db.json"), "w", encoding="utf-8") as fh:
            json.dump({"name": name, "total_quota": total_quota}, fh)
        return Database(name=name, path=path, total_quota=total_quota)

    def database(self, name: str) -> Database:
        path = os.path.join(self.root, name)
        cfg_path = os.path.join(path, "db.json")
        if not os.path.exists(cfg_path):
            raise TableNotFoundError(f"database {name!r} not found in {self.root}")
        with open(cfg_path, encoding="utf-8") as fh:
            cfg = json.load(fh)
        return Database(name=name, path=path, total_quota=cfg["total_quota"])

    def databases(self) -> list[Database]:
        out = []
        for name in sorted(os.listdir(self.root)):
            if os.path.isfile(os.path.join(self.root, name, "db.json")):
                out.append(self.database(name))
        return out

    # --------------------------------------------------------------- tables
    def create_table(
        self,
        db: str,
        name: str,
        spec: PartitionSpec | None = None,
        properties: dict | None = None,
        created_at: float | None = None,
    ) -> LstTable:
        return LstTable.create(
            os.path.join(self.root, db, name),
            name=f"{db}.{name}",
            spec=spec,
            properties=properties,
            created_at=created_at if created_at is not None else time.time(),
        )

    def load_table(self, db: str, name: str) -> LstTable:
        return LstTable.load(os.path.join(self.root, db, name))

    def list_tables(self) -> list[tuple[str, str]]:
        """All (database, table) pairs — AutoComp's candidate universe."""
        return [
            (d.name, t) for d in self.databases() for t in d.tables()
        ]

    def total_file_count(self) -> int:
        """Fleet-wide live data-file count (the Fig 6 / Fig 10c y-axis)."""
        return sum(
            self.load_table(db, t).file_count() for db, t in self.list_tables()
        )
