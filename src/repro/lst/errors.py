"""Exception hierarchy for the Iceberg-lite LST substrate."""


class LstError(Exception):
    """Base class for all LST substrate errors."""


class TableNotFoundError(LstError):
    """Raised when loading a table whose metadata directory does not exist."""


class TableExistsError(LstError):
    """Raised when creating a table at a path that already holds one."""


class CommitConflictError(LstError):
    """Optimistic-concurrency failure: another commit won the target version.

    Mirrors Iceberg's ``CommitFailedException``. The paper observed
    (§4.4/§6.2) that with Iceberg v1.2.0 concurrent operations on one table
    conflict even when they touch disjoint partitions, because they race on
    the same table-level metadata pointer — exactly the semantics of racing
    on one ``v<N>.json`` file here.
    """

    def __init__(self, table_name: str, base_version: int, current_version: int):
        self.table_name = table_name
        self.base_version = base_version
        self.current_version = current_version
        super().__init__(
            f"commit conflict on table {table_name!r}: prepared against "
            f"v{base_version} but current is v{current_version}"
        )


class ValidationError(LstError):
    """A rebase-retry found the operation no longer applies.

    E.g. a compaction planned to replace files that a concurrent commit
    already removed — the rewrite must be abandoned, not retried.
    """
