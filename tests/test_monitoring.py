"""Synthetic enterprise monitoring substrate tests."""
import pandas as pd
import pytest

from repro.core.schema import validate_events
from repro.monitoring.attack import (
    ATTACKER_IP,
    STEP_OFFSETS,
    attack_events,
    step_windows,
)
from repro.monitoring.background import background_events
from repro.monitoring.feed import assemble, demo_feed
from repro.monitoring.hosts import (
    APACHE_BENIGN_CHILDREN,
    db_host,
    make_hosts,
    victim_host,
    web_host,
)


@pytest.fixture(scope="module")
def hosts():
    return make_hosts()


@pytest.fixture(scope="module")
def bg(hosts):
    return background_events(hosts, duration_s=600, events_per_host_per_min=30)


@pytest.fixture(scope="module")
def atk(hosts):
    return attack_events(hosts)


# -------------------------------------------------------------------- hosts
def test_host_inventory_roles(hosts):
    roles = [h.role for h in hosts]
    assert roles.count("workstation") == 4
    assert roles.count("web") == 1 and roles.count("db") == 1


def test_host_ids_unique(hosts):
    assert len({h.agentid for h in hosts}) == len(hosts)
    assert len({h.ip for h in hosts}) == len(hosts)


def test_special_hosts(hosts):
    assert victim_host(hosts).role == "workstation"
    assert db_host(hosts).role == "db"
    assert web_host(hosts).role == "web"


# --------------------------------------------------------------- background
def test_background_deterministic(hosts):
    a = background_events(hosts, duration_s=300, seed=3)
    b = background_events(hosts, duration_s=300, seed=3)
    pd.testing.assert_frame_equal(a, b)


def test_background_seed_changes_output(hosts):
    a = background_events(hosts, duration_s=300, seed=3)
    b = background_events(hosts, duration_s=300, seed=4)
    assert not a.equals(b)


def test_background_rate(hosts, bg):
    per_host = bg.groupby("agentid").size()
    assert (per_host == 300).all()  # 30/min * 10 min


def test_background_within_time_range(bg):
    start = pd.Timestamp("2020-04-01 09:00:00")
    assert bg["ts"].min() >= start
    assert bg["ts"].max() < start + pd.Timedelta(seconds=600)


def test_apache_children_are_benign(bg):
    starts = bg[(bg["subj_exe"] == "apache.exe") & (bg["op"] == "start")]
    assert len(starts) > 0
    assert set(starts["obj_exe"]) <= set(APACHE_BENIGN_CHILDREN)


def test_excel_never_spawns_in_background(bg):
    starts = bg[(bg["subj_exe"] == "excel.exe") & (bg["op"] == "start")]
    assert len(starts) == 0


def test_db_server_talks_to_client_pool(hosts, bg):
    db = db_host(hosts)
    net = bg[(bg["agentid"] == db.agentid) & (bg["obj_type"] == "ip")]
    assert net["dstip"].str.startswith("10.0.1.").all()
    assert net["dstip"].nunique() >= 5  # DBSCAN needs a dense benign cluster


def test_benign_amounts_below_exfil_scale(bg):
    net = bg[bg["obj_type"] == "ip"]
    assert net["amount"].max() < 1_000_000


def test_attacker_ip_never_in_background(bg):
    assert (bg["dstip"] != ATTACKER_IP).all() or bg["dstip"].isna().any()
    assert ATTACKER_IP not in set(bg["dstip"].dropna())


# ------------------------------------------------------------------- attack
def test_attack_has_all_five_steps(atk):
    assert set(atk["step"]) == {"c1", "c2", "c3", "c4", "c5"}


def test_attack_step_ordering(atk):
    step_start = atk.groupby("step")["ts"].min()
    assert list(step_start.sort_values().index) == ["c1", "c2", "c3", "c4", "c5"]


def test_attack_step_offsets(atk):
    t0 = atk["ts"].min()
    starts = atk.groupby("step")["ts"].min()
    for step, off in STEP_OFFSETS.items():
        assert (starts[step] - t0).total_seconds() == off


def test_step_windows_helper():
    w = step_windows("2020-04-01 09:30:00")
    assert w["c5"] - w["c1"] == pd.Timedelta(seconds=900)


def test_c5_contains_query1_signature(atk, hosts):
    db = db_host(hosts)
    c5 = atk[atk["step"] == "c5"]
    assert ((c5["subj_exe"] == "cmd.exe") & (c5["obj_exe"] == "osql.exe")).any()
    assert ((c5["subj_exe"] == "sqlservr.exe") & (c5["file_name"] == "backup1.dmp")).any()
    assert ((c5["subj_exe"] == "sbblv.exe") & (c5["file_name"] == "backup1.dmp")).any()
    exfil = c5[(c5["subj_exe"] == "sbblv.exe") & (c5["dstip"] == ATTACKER_IP)]
    assert len(exfil) == 10
    assert (c5["agentid"] == db.agentid).all()


def test_c5_sqlservr_dump_traffic(atk):
    dump = atk[
        (atk["step"] == "c5")
        & (atk["subj_exe"] == "sqlservr.exe")
        & (atk["dstip"] == ATTACKER_IP)
    ]
    assert len(dump) >= 1
    assert (dump["amount"] >= 1_000_000).all()


def test_c2_excel_starts_unseen_process(atk):
    c2 = atk[atk["step"] == "c2"]
    assert ((c2["subj_exe"] == "excel.exe") & (c2["obj_exe"] == "mal_dropper.exe")).any()


def test_c3_portscan_and_gsecdump(atk):
    c3 = atk[atk["step"] == "c3"]
    scan = c3[(c3["op"] == "connect") & (c3["subj_exe"] == "backdoor.exe")]
    assert scan["dstport"].nunique() >= 50
    assert ((c3["subj_exe"] == "gsecdump.exe") & (c3["file_name"] == "credentials.db")).any()


def test_attack_on_victim_then_db(atk, hosts):
    early = atk[atk["step"].isin(["c1", "c2", "c3"])]
    late = atk[atk["step"].isin(["c4", "c5"])]
    assert set(early["agentid"]) == {victim_host(hosts).agentid}
    assert set(late["agentid"]) == {db_host(hosts).agentid}


# --------------------------------------------------------------------- feed
def test_assemble_sorted_unique_eids(hosts, bg, atk):
    feed = assemble(bg, atk, hosts)
    assert feed.events["ts"].is_monotonic_increasing
    assert feed.events["eid"].is_unique
    assert validate_events(feed.events) == []


def test_truth_maps_attack_events(hosts, bg, atk):
    feed = assemble(bg, atk, hosts)
    assert len(feed.truth) == len(atk)
    merged = feed.truth.merge(feed.events, on="eid")
    assert set(merged["step"]) == {"c1", "c2", "c3", "c4", "c5"}


def test_demo_feed_no_attack():
    feed = demo_feed(with_attack=False, duration_s=300, events_per_host_per_min=5)
    assert feed.truth.empty
    assert ATTACKER_IP not in set(feed.events["dstip"].dropna())


def test_demo_feed_deterministic():
    a = demo_feed(duration_s=300, events_per_host_per_min=5)
    b = demo_feed(duration_s=300, events_per_host_per_min=5)
    pd.testing.assert_frame_equal(a.events, b.events)
