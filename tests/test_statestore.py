"""Tests for the embedded aggregation state store (paper §4.1.3)."""
import pytest

from repro.core.statestore import StateStore


def test_put_get_roundtrip(tmp_path):
    s = StateStore(str(tmp_path))
    s.put("card-1", {"sum": 10.0, "n": 2})
    assert s.get("card-1") == {"sum": 10.0, "n": 2}
    assert s.get("missing") is None


def test_values_are_serialized_not_shared():
    """Like RocksDB: a read returns a copy; mutating it does not write back."""
    s = StateStore()
    s.put("k", [1, 2])
    v = s.get("k")
    v.append(3)
    assert s.get("k") == [1, 2]


def test_column_families_are_isolated():
    s = StateStore()
    s.put("k", 1, cf="a")
    s.put("k", 2, cf="b")
    assert s.get("k", cf="a") == 1
    assert s.get("k", cf="b") == 2
    assert s.get("k") is None  # default cf untouched
    s.delete("k", cf="a")
    assert s.get("k", cf="a") is None
    assert s.get("k", cf="b") == 2


def test_len_and_keys():
    s = StateStore()
    s.put("a", 1)
    s.put("b", 2, cf="other")
    assert len(s) == 2
    assert sorted(s.keys()) == ["a"]
    assert sorted(s.keys("other")) == ["b"]


def test_checkpoint_restore_roundtrip(tmp_path):
    s = StateStore(str(tmp_path))
    s.put("a", {"x": 1})
    s.put(("c", 5), 7, cf="panes")
    path = s.checkpoint("t1")
    s2 = StateStore.restore(path, str(tmp_path / "copy"))
    assert s2.get("a") == {"x": 1}
    assert s2.get(("c", 5), cf="panes") == 7


def test_checkpoint_without_dir_raises():
    with pytest.raises(RuntimeError):
        StateStore().checkpoint()


def test_synthetic_access_cost_accumulates():
    s = StateStore(access_cost_us=5.0)
    s.put("a", 1)
    s.get("a")
    s.get("b")
    assert s.take_costs() == pytest.approx(15.0)
    assert s.take_costs() == 0.0  # reset
    assert s.gets == 2 and s.puts == 1
