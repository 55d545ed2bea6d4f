"""IMap: the distributed, observable, queryable map of the grid.

The paper's Jet stores every state snapshot in an ``IMap`` (§2.4,
§4.1): a key-value structure partitioned across the cluster with
primary + backup replicas. This module provides that interface over
:class:`repro.imdg.cluster.Cluster`, plus the query/scan operations the
engine uses to restore processor state per partition.
"""
from collections.abc import Callable, Iterator

from .cluster import Cluster
from .partition import partition_id


class IMap:
    """A named, partitioned, replicated key-value map.

    All operations route by ``partition_id(key)``; writes are applied to
    the primary and its backups synchronously (AP behaviour under no
    partition, per §1 — network partitions are out of scope for the
    single-process grid).
    """

    def __init__(self, name: str, cluster: Cluster):
        self.name = name
        self.cluster = cluster
        cluster.register_map(name)
        self._listeners: list[Callable[[str, object, object], None]] = []

    # -- basic ops ------------------------------------------------------

    def put(self, key, value) -> None:
        self.cluster.put(self.name, key, value)
        for fn in self._listeners:
            fn("put", key, value)

    def get(self, key):
        return self.cluster.get(self.name, key)

    def remove(self, key) -> None:
        self.cluster.remove(self.name, key)
        for fn in self._listeners:
            fn("remove", key, None)

    def put_all(self, entries: dict) -> None:
        for k, v in entries.items():
            self.put(k, v)

    def __len__(self) -> int:
        return sum(1 for _ in self.entry_set())

    def __contains__(self, key) -> bool:
        return self.get(key) is not None

    # -- scans / queries ------------------------------------------------

    def entry_set(self) -> Iterator[tuple[object, object]]:
        """Iterate all entries from primary replicas (cluster-wide scan)."""
        for pid in range(self.cluster.n_partitions):
            yield from self.cluster.primary_frag(self.name, pid).items()

    def values(self, predicate: Callable[[object], bool] | None = None) -> list:
        """Queryable-map scan: all values, optionally filtered."""
        return [v for _, v in self.entry_set() if predicate is None or predicate(v)]

    def partition_entries(self, pid: int) -> dict:
        """Snapshot of one partition's primary fragment (engine restore
        path: each processor instance reads only its own partitions)."""
        return dict(self.cluster.primary_frag(self.name, pid))

    def partition_of(self, key) -> int:
        return partition_id(key, self.cluster.n_partitions)

    # -- observability --------------------------------------------------

    def add_listener(self, fn: Callable[[str, object, object], None]) -> None:
        """Register an entry listener (the CDC / view-maintenance hook
        from §6); called as ``fn(op, key, value)`` after each mutation."""
        self._listeners.append(fn)
