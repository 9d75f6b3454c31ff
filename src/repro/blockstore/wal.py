"""Snapshot + write-ahead-log crash recovery (paper §4.4).

The paper snapshots the in-memory structures (centroid index, version
map, block mapping + free pool) periodically and logs every update request
between snapshots; recovery loads the latest snapshot and replays the WAL.
Disk data is made consistent by block-level copy-on-write: blocks freed
between two snapshots sit in a pre-release buffer and only enter the free
pool once the next snapshot lands (see ``BlockController.pre_release``).

:class:`RecoveryLog` is filesystem-backed (pickle) so a test can "crash"
by discarding the live index object and rebuild purely from disk.
"""
from __future__ import annotations

import os
import pickle
from typing import Any, Callable


class RecoveryLog:
    """Durable snapshot + WAL pair under a directory."""

    def __init__(self, root: str):
        self.root = root
        os.makedirs(root, exist_ok=True)
        self._wal_path = os.path.join(root, "wal.pkl")
        self._snap_path = os.path.join(root, "snapshot.pkl")
        self._wal_fh = open(self._wal_path, "ab")

    # -- logging ----------------------------------------------------------
    def log(self, record: Any) -> None:
        """Append one update record (insert/delete request) to the WAL."""
        pickle.dump(record, self._wal_fh)
        self._wal_fh.flush()

    def snapshot(self, state: Any) -> None:
        """Write a new snapshot, then truncate the WAL (paper: WAL deleted
        when a new snapshot is generated)."""
        tmp = self._snap_path + ".tmp"
        with open(tmp, "wb") as fh:
            pickle.dump(state, fh)
        os.replace(tmp, self._snap_path)
        self._wal_fh.close()
        self._wal_fh = open(self._wal_path, "wb")

    # -- recovery ---------------------------------------------------------
    def recover(self) -> tuple[Any, list[Any]]:
        """Return (latest snapshot state or None, WAL records since it)."""
        state = None
        if os.path.exists(self._snap_path):
            with open(self._snap_path, "rb") as fh:
                state = pickle.load(fh)
        records: list[Any] = []
        if os.path.exists(self._wal_path):
            with open(self._wal_path, "rb") as fh:
                while True:
                    try:
                        records.append(pickle.load(fh))
                    except EOFError:
                        break
        return state, records

    def replay(self, apply: Callable[[Any], None]) -> int:
        """Apply every WAL record through ``apply``; returns the count."""
        _, records = self.recover()
        for r in records:
            apply(r)
        return len(records)

    def close(self) -> None:
        self._wal_fh.close()
