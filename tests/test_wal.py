"""Tests for the snapshot + WAL recovery log (paper §4.4)."""
import pytest

from repro.blockstore.wal import RecoveryLog


@pytest.fixture()
def log(tmp_path) -> RecoveryLog:
    return RecoveryLog(str(tmp_path / "wal"))


class TestRecoveryLog:
    def test_fresh_log_is_empty(self, log):
        state, records = log.recover()
        assert state is None and records == []

    def test_log_and_recover_records(self, log):
        log.log(("insert", 1))
        log.log(("delete", 2))
        _, records = log.recover()
        assert records == [("insert", 1), ("delete", 2)]

    def test_snapshot_truncates_wal(self, log):
        log.log(("insert", 1))
        log.snapshot({"n": 1})
        state, records = log.recover()
        assert state == {"n": 1} and records == []

    def test_records_after_snapshot_are_kept(self, log):
        log.snapshot({"n": 0})
        log.log(("insert", 5))
        state, records = log.recover()
        assert state == {"n": 0} and records == [("insert", 5)]

    def test_newer_snapshot_replaces_older(self, log):
        log.snapshot({"n": 1})
        log.log("x")
        log.snapshot({"n": 2})
        state, records = log.recover()
        assert state == {"n": 2} and records == []

    def test_replay_applies_in_order(self, log):
        for i in range(10):
            log.log(i)
        seen = []
        n = log.replay(seen.append)
        assert n == 10 and seen == list(range(10))

    def test_recovery_survives_process_crash(self, tmp_path):
        # "crash" = drop the live object; a fresh instance reads from disk
        path = str(tmp_path / "wal2")
        log1 = RecoveryLog(path)
        log1.snapshot({"base": True})
        log1.log(("insert", 42))
        del log1  # no close() — simulates a crash
        log2 = RecoveryLog(path)
        state, records = log2.recover()
        assert state == {"base": True} and records == [("insert", 42)]

    def test_arbitrary_payloads(self, log):
        import numpy as np

        vec = np.arange(4, dtype=np.float32)
        log.log(("insert", 7, vec))
        _, records = log.recover()
        op, vid, v = records[0]
        assert op == "insert" and vid == 7
        np.testing.assert_array_equal(v, vec)
