"""GCS: transactional KV store with a write-ahead journal."""
import pytest

from repro.core.gcs import Gcs, TransactionError


def test_set_get():
    g = Gcs()
    g.set("ns", "k", 1)
    assert g.get("ns", "k") == 1
    assert g.get("ns", "missing") is None
    assert g.get("ns", "missing", 7) == 7


def test_append_builds_list():
    g = Gcs()
    g.transaction([["append", "lin", "c", 1]])
    g.transaction([["append", "lin", "c", 2]])
    assert g.get("lin", "c") == [1, 2]


def test_delete():
    g = Gcs()
    g.set("ns", "k", 1)
    g.delete("ns", "k")
    assert g.get("ns", "k") is None
    g.delete("ns", "never-existed")  # deleting absent keys is a no-op


def test_multi_op_transaction_atomic_apply():
    g = Gcs()
    g.transaction(
        [["set", "a", "x", 1], ["append", "b", "y", 2], ["del", "a", "z"]]
    )
    assert g.get("a", "x") == 1 and g.get("b", "y") == [2]
    assert g.txn_count == 1


def test_malformed_transaction_rejected_entirely():
    g = Gcs()
    with pytest.raises(TransactionError):
        g.transaction([["set", "a", "x", 1], ["bogus", "a", "y", 2]])
    # write-ahead validation: nothing applied, nothing journaled
    assert g.get("a", "x") is None
    assert g.txn_count == 0
    assert g.journal == []


def test_table_returns_copy():
    g = Gcs()
    g.set("ns", "k", 1)
    t = g.table("ns")
    t["k"] = 999
    assert g.get("ns", "k") == 1


def test_replay_reconstructs_state():
    g = Gcs()
    g.set("a", "x", 1)
    g.transaction([["append", "l", "c", [1, 2]], ["set", "a", "y", 3]])
    g.delete("a", "x")
    g2 = Gcs.replay(g.journal)
    assert g2.table("a") == g.table("a")
    assert g2.table("l") == g.table("l")


def test_journal_file_persistence_and_crash_recovery(tmp_path):
    path = str(tmp_path / "wal.jsonl")
    g = Gcs(journal_path=path)
    g.transaction([["append", "lineage", "0.1", ["S", 3]]])
    g.transaction(
        [["append", "lineage", "0.1", ["C", 0, 1, 0, 4]],
         ["set", "closed", "0.1", 2]]
    )
    g.close()  # head process "crashes"
    g2 = Gcs.recover_from_journal(path)
    assert g2.get("lineage", "0.1") == [["S", 3], ["C", 0, 1, 0, 4]]
    assert g2.get("closed", "0.1") == 2


def test_journal_written_before_apply(tmp_path):
    """Write-ahead property: the journal line exists on disk by the time
    the transaction is visible in the store."""
    path = str(tmp_path / "wal.jsonl")
    g = Gcs(journal_path=path)
    g.set("ns", "k", 42)
    with open(path) as fh:
        lines = fh.readlines()
    assert len(lines) == 1
    assert '"k"' in lines[0]


def test_keys_listing():
    g = Gcs()
    g.set("ns", "a", 1)
    g.set("ns", "b", 2)
    assert sorted(g.keys("ns")) == ["a", "b"]
    assert g.keys("empty") == []
