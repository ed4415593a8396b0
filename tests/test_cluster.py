"""End-to-end tests for the distributed Railgun cluster (paper §3–§4.2).

Correctness reference: brute-force per-event sliding aggregates over the
full client event sequence. The same events flow through front-end
routing → partitioner topics → processor units → reply collection
(Fig 3), across rebalances, node failures and scale-out.
"""
import numpy as np
import pytest

from repro.engine import RailgunCluster
from repro.core.windows import MINUTE

Q1 = ("SELECT sum(amount), count(amount) FROM payments "
      "GROUP BY card_id OVER sliding 1 minute")
Q2 = "SELECT avg(amount) FROM payments GROUP BY merchant_id OVER sliding 1 minute"

SUM = "sum(amount) by card_id over sliding 60000ms"
CNT = "count(amount) by card_id over sliding 60000ms"
AVG = "avg(amount) by merchant_id over sliding 60000ms"


def _events(n=120, seed=0, n_cards=6, n_merchants=3):
    rng = np.random.default_rng(seed)
    ts = np.cumsum(rng.integers(200, 1500, n))
    return [
        {
            "id": f"e{i}",
            "ts": int(ts[i]),
            "card_id": int(rng.integers(1, n_cards + 1)),
            "merchant_id": int(rng.integers(1, n_merchants + 1)),
            "amount": float(np.round(rng.uniform(1, 100), 2)),
        }
        for i in range(n)
    ]


def _brute(events, i, key, window_ms=MINUTE):
    e = events[i]
    return [
        x["amount"]
        for x in events[: i + 1]
        if x[key] == e[key] and e["ts"] - window_ms < x["ts"] <= e["ts"]
    ]


def _check(events, i, ans):
    v_card = _brute(events, i, "card_id")
    v_merch = _brute(events, i, "merchant_id")
    assert ans[SUM] == pytest.approx(sum(v_card))
    assert ans[CNT] == len(v_card)
    assert ans[AVG] == pytest.approx(np.mean(v_merch))


@pytest.fixture
def cluster(tmp_path):
    c = RailgunCluster(
        str(tmp_path), n_nodes=3, units_per_node=2, replication=2,
        reservoir_kwargs={"chunk_events": 16, "cache_chunks": 16},
    )
    c.register_stream("payments", [Q1, Q2], partitions=4)
    return c


def test_stream_creates_one_topic_per_partitioner(cluster):
    assert "payments.card_id" in cluster.kafka.topics()
    assert "payments.merchant_id" in cluster.kafka.topics()
    assert cluster.kafka.partitions("payments.card_id") == 4


def test_assignment_covers_all_tasks_with_replication(cluster):
    st = cluster.stats()
    assert st["tasks"] == 8  # 2 topics × 4 partitions
    total_active = sum(st["active_per_unit"].values())
    total_replica = sum(st["replica_per_unit"].values())
    assert total_active == 8  # exactly one active owner per task
    assert total_replica == 8  # replication 2 ⇒ one replica each


def test_end_to_end_answers_match_bruteforce(cluster):
    events = _events(n=100)
    for i, e in enumerate(events):
        ans = cluster.send("payments", e)
        _check(events, i, ans)


def test_multi_groupby_metric_rides_existing_partitioner(tmp_path):
    """§4: a metric grouping by (card, merchant) can use topic card."""
    c = RailgunCluster(str(tmp_path), n_nodes=2, units_per_node=1, replication=1)
    q = ("SELECT count(amount) FROM payments "
         "GROUP BY card_id, merchant_id OVER sliding 1 minute")
    c.register_stream("payments", [Q1, q], partitioners=["card_id"], partitions=2)
    assert c.kafka.topics() == [
        "payments.card_id", "replies.node0", "replies.node1"
    ]
    events = _events(n=60)
    name = "count(amount) by card_id,merchant_id over sliding 60000ms"
    for i, e in enumerate(events):
        ans = c.send("payments", e)
        expect = [
            x for x in events[: i + 1]
            if (x["card_id"], x["merchant_id"]) == (e["card_id"], e["merchant_id"])
            and e["ts"] - MINUTE < x["ts"] <= e["ts"]
        ]
        assert ans[name] == len(expect)


def test_replicas_stay_consistent_with_actives(cluster):
    for e in _events(n=80):
        cluster.send("payments", e)
    # for every task, every holder's reservoir has identical event counts
    by_task = {}
    for u in cluster.units.values():
        for t, tp in u.task_processors.items():
            if t in u.active or t in u.replica:
                by_task.setdefault(t, []).append(tp.reservoir.total_events)
    assert by_task, "no tasks assigned?"
    for t, counts in by_task.items():
        assert len(set(counts)) == 1, f"replica divergence on {t}: {counts}"
        assert len(counts) == 2  # active + 1 replica


def test_node_failure_mid_stream_keeps_answers_exact(cluster):
    events = _events(n=120, seed=4)
    for i, e in enumerate(events):
        if i == 60:
            cluster.kill_node("node1")
        ans = cluster.send("payments", e, via_node="node0")
        _check(events, i, ans)
    assert cluster.stats()["nodes"] == 2


def test_two_sequential_node_failures(cluster):
    events = _events(n=90, seed=5)
    for i, e in enumerate(events):
        if i == 30:
            cluster.kill_node("node2")
        if i == 60:
            cluster.kill_node("node1")
        ans = cluster.send("payments", e, via_node="node0")
        _check(events, i, ans)


def test_failure_without_replicas_recovers_from_log_replay(tmp_path):
    """Replication 1: the dead node's tasks restart fresh and rewind the
    whole partition from the messaging layer (§3.3)."""
    c = RailgunCluster(
        str(tmp_path), n_nodes=2, units_per_node=1, replication=1,
        reservoir_kwargs={"chunk_events": 16, "cache_chunks": 16},
    )
    c.register_stream("payments", [Q1, Q2], partitions=2)
    events = _events(n=80, seed=6)
    for i, e in enumerate(events):
        if i == 40:
            c.kill_node("node1")
        ans = c.send("payments", e, via_node="node0")
        _check(events, i, ans)


def test_scale_out_rebalances_and_keeps_answers(cluster):
    events = _events(n=90, seed=7)
    for i, e in enumerate(events):
        if i == 45:
            cluster.add_node("node3")
        ans = cluster.send("payments", e)
        _check(events, i, ans)
    st = cluster.stats()
    assert st["nodes"] == 4
    # the new node received some work
    new_units = [u for u in st["active_per_unit"] if u.startswith("node3")]
    total_new = sum(
        st["active_per_unit"][u] + st["replica_per_unit"][u] for u in new_units
    )
    assert total_new > 0


def test_rebalance_is_sticky_on_noop(cluster):
    for e in _events(n=40, seed=8):
        cluster.send("payments", e)
    before = {
        uid: (set(u.active), set(u.replica)) for uid, u in cluster.units.items()
    }
    cluster.rebalance()  # nothing changed in the cluster
    after = {
        uid: (set(u.active), set(u.replica)) for uid, u in cluster.units.items()
    }
    assert before == after


def test_duplicate_delivery_is_idempotent(cluster):
    events = _events(n=30, seed=9)
    for e in events[:-1]:
        cluster.send("payments", e)
    e = events[-1]
    a1 = cluster.send("payments", e)
    a2 = cluster.send("payments", dict(e))  # same event id re-sent
    assert a1 == a2  # dedup in the reservoir: aggregates unchanged
