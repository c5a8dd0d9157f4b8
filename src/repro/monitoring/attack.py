"""The demo's five-step APT attack trace (§III, steps c1-c5).

The paper performs a real attack with known exploits in a controlled
environment; we inject the event-level *signatures* of each step at
known offsets from ``attack_start``. The entities and operations are
exactly those the paper's 8 queries reference (osql.exe, backup1.dmp,
sbblv.exe, the ``*.129`` attacker host, gsecdump.exe, Excel starting a
never-seen-before script, abnormally high network volume from the DB
server), so detection exercises the same query logic as the live demo.

Each step's events carry a ``step`` tag (c1..c5) in the returned frame's
companion column — `feed.assemble` strips it from the event columns but
tests and the T1 detection-lag table use it as ground truth.
"""
from __future__ import annotations

import pandas as pd

from .hosts import Host, db_host, victim_host

ATTACKER_IP = "192.168.99.129"  # the paper's obfuscated "xxx.129"

# Offsets (seconds from attack_start) at which each step begins.
STEP_OFFSETS = {"c1": 0, "c2": 60, "c3": 300, "c4": 600, "c5": 900}

# Fixed PIDs for attack processes, out of the benign PID ranges.
_PIDS = {
    "outlook.exe": 9001,
    "excel.exe": 9002,
    "mal_dropper.exe": 9003,
    "backdoor.exe": 9004,
    "cmd.exe": 9005,
    "gsecdump.exe": 9006,
    "cscript.exe": 9007,
    "backdoor2.exe": 9008,
    "osql.exe": 9009,
    "sqlservr.exe": 9010,
    "sbblv.exe": 9011,
}


def _ev(
    step: str,
    t: pd.Timestamp,
    agentid: str,
    subj: str,
    op: str,
    *,
    obj_proc: str | None = None,
    file_name: str | None = None,
    dstip: str | None = None,
    dstport: int | None = None,
    srcip: str | None = None,
    amount: float | None = None,
) -> dict:
    obj_type = "proc" if obj_proc else ("file" if file_name else "ip")
    return {
        "step": step,
        "ts": t,
        "agentid": agentid,
        "subj_exe": subj,
        "subj_pid": _PIDS.get(subj, 9999),
        "op": op,
        "obj_type": obj_type,
        "obj_exe": obj_proc,
        "obj_pid": _PIDS.get(obj_proc, 9100) if obj_proc else None,
        "file_name": file_name,
        "srcip": srcip,
        "srcport": 51000 if obj_type == "ip" else None,
        "dstip": dstip,
        "dstport": dstport,
        "amount": amount,
    }


def attack_events(
    hosts: list[Host],
    *,
    attack_start: str | pd.Timestamp = "2020-04-01 09:30:00",
    exfil_events: int = 10,
    exfil_bytes_per_event: float = 5_000_000.0,
    portscan_ports: int = 60,
) -> pd.DataFrame:
    """Events of the five attack steps, with a ground-truth ``step`` tag."""
    t0 = pd.Timestamp(attack_start)
    victim = victim_host(hosts)
    db = db_host(hosts)
    ev: list[dict] = []

    def at(step: str, delta_s: float) -> pd.Timestamp:
        return t0 + pd.Timedelta(seconds=STEP_OFFSETS[step] + delta_s)

    # --- c1 Initial Compromise: crafted email with malicious Excel file.
    ev.append(
        _ev("c1", at("c1", 0), victim.agentid, "outlook.exe", "read",
            dstip="203.0.113.25", dstport=993, srcip=victim.ip, amount=482_000)
    )
    ev.append(
        _ev("c1", at("c1", 5), victim.agentid, "outlook.exe", "write",
            file_name="invoice_macro.xlsm", amount=482_000)
    )
    ev.append(
        _ev("c1", at("c1", 20), victim.agentid, "outlook.exe", "start",
            obj_proc="excel.exe")
    )

    # --- c2 Malware Infection: macro downloads + executes malicious
    # script (CVE-2008-0081), which opens a backdoor.
    ev.append(
        _ev("c2", at("c2", 0), victim.agentid, "excel.exe", "read",
            file_name="invoice_macro.xlsm", amount=482_000)
    )
    ev.append(
        _ev("c2", at("c2", 10), victim.agentid, "excel.exe", "start",
            obj_proc="mal_dropper.exe")
    )
    ev.append(
        _ev("c2", at("c2", 15), victim.agentid, "mal_dropper.exe", "read",
            dstip=ATTACKER_IP, dstport=8443, srcip=victim.ip, amount=240_000)
    )
    ev.append(
        _ev("c2", at("c2", 20), victim.agentid, "mal_dropper.exe", "write",
            file_name="backdoor.exe", amount=240_000)
    )
    ev.append(
        _ev("c2", at("c2", 25), victim.agentid, "mal_dropper.exe", "start",
            obj_proc="backdoor.exe")
    )
    ev.append(
        _ev("c2", at("c2", 30), victim.agentid, "backdoor.exe", "connect",
            dstip=ATTACKER_IP, dstport=8443, srcip=victim.ip, amount=64.0)
    )

    # --- c3 Privilege Escalation: port-scan the subnet to find the DB
    # server, then run gsecdump to steal DB credentials.
    for i in range(portscan_ports):
        ev.append(
            _ev("c3", at("c3", i * 0.5), victim.agentid, "backdoor.exe",
                "connect", dstip=db.ip, dstport=1000 + i, srcip=victim.ip,
                amount=60.0)
        )
    ev.append(
        _ev("c3", at("c3", 40), victim.agentid, "backdoor.exe", "start",
            obj_proc="cmd.exe")
    )
    ev.append(
        _ev("c3", at("c3", 45), victim.agentid, "cmd.exe", "start",
            obj_proc="gsecdump.exe")
    )
    ev.append(
        _ev("c3", at("c3", 50), victim.agentid, "gsecdump.exe", "read",
            file_name="credentials.db", amount=20_000)
    )
    ev.append(
        _ev("c3", at("c3", 55), victim.agentid, "gsecdump.exe", "write",
            dstip=ATTACKER_IP, dstport=8443, srcip=victim.ip, amount=20_000)
    )

    # --- c4 Penetration into Database Server: VBScript drops another
    # malicious script/backdoor on the DB host.
    ev.append(
        _ev("c4", at("c4", 0), db.agentid, "sqlservr.exe", "read",
            dstip=victim.ip, dstport=1433, srcip=db.ip, amount=4_000)
    )
    ev.append(
        _ev("c4", at("c4", 10), db.agentid, "cmd.exe", "start",
            obj_proc="cscript.exe")
    )
    ev.append(
        _ev("c4", at("c4", 15), db.agentid, "cscript.exe", "write",
            file_name="dropper.vbs", amount=9_000)
    )
    ev.append(
        _ev("c4", at("c4", 20), db.agentid, "cscript.exe", "start",
            obj_proc="backdoor2.exe")
    )
    ev.append(
        _ev("c4", at("c4", 25), db.agentid, "backdoor2.exe", "write",
            file_name="sbblv.exe", amount=350_000)
    )
    ev.append(
        _ev("c4", at("c4", 30), db.agentid, "backdoor2.exe", "connect",
            dstip=ATTACKER_IP, dstport=8443, srcip=db.ip, amount=64.0)
    )

    # --- c5 Data Exfiltration: osql dumps the DB; sbblv sends the dump
    # to the attacker host (matches the paper's Query 1 exactly).
    ev.append(
        _ev("c5", at("c5", 0), db.agentid, "cmd.exe", "start",
            obj_proc="osql.exe")
    )
    ev.append(
        _ev("c5", at("c5", 10), db.agentid, "osql.exe", "write",
            file_name="dump_cmd.sql", amount=400)
    )
    ev.append(
        _ev("c5", at("c5", 20), db.agentid, "sqlservr.exe", "write",
            file_name="backup1.dmp", amount=float(exfil_events) * exfil_bytes_per_event)
    )
    ev.append(
        _ev("c5", at("c5", 30), db.agentid, "backdoor2.exe", "start",
            obj_proc="sbblv.exe")
    )
    ev.append(
        _ev("c5", at("c5", 40), db.agentid, "sbblv.exe", "read",
            file_name="backup1.dmp",
            amount=float(exfil_events) * exfil_bytes_per_event)
    )
    for i in range(exfil_events):
        ev.append(
            _ev("c5", at("c5", 50 + i * 5), db.agentid, "sbblv.exe", "write",
                dstip=ATTACKER_IP, dstport=8443, srcip=db.ip,
                amount=exfil_bytes_per_event)
        )
    # The osql dump session also pulls query results from sqlservr over
    # the network to the attacker host — this is the traffic the paper's
    # Query 4 clusters (sqlservr per-dstip volume, DBSCAN outlier).
    for i in range(max(1, exfil_events // 2)):
        ev.append(
            _ev("c5", at("c5", 55 + i * 7), db.agentid, "sqlservr.exe", "write",
                dstip=ATTACKER_IP, dstport=1433, srcip=db.ip,
                amount=exfil_bytes_per_event)
        )

    return pd.DataFrame(ev)


def step_windows(attack_start: str | pd.Timestamp) -> dict[str, pd.Timestamp]:
    """Ground-truth start time of each attack step (for detection lag)."""
    t0 = pd.Timestamp(attack_start)
    return {s: t0 + pd.Timedelta(seconds=o) for s, o in STEP_OFFSETS.items()}
