"""Benign background system activity for the synthetic event feed.

Each host emits a role-dependent mix of file, process, and network
events at a configurable rate. All draws are vectorised numpy with a
per-call seed, so the same parameters always produce the same feed (the
DuckDB oracle and the streaming/batch parity tests rely on this).

Rates are calibrated so the demo's anomaly thresholds separate benign
from attack behaviour the same way the paper describes:

- network event ``amount`` is lognormal with mean ~2-8 KB, so a benign
  process's 10-minute average stays well below the time-series query's
  10 000-byte spike threshold only in *average* terms (sqlservr runs a
  bit hotter but steady, so the SMA spike condition stays false);
- the DB server talks to a pool of internal client IPs every window, so
  DBSCAN(1e5, 5) finds a dense benign cluster and the exfiltration IP
  (tens of MB in one window) is noise;
- Apache spawns only its benign child set, so the invariant query's
  training windows converge.
"""
from __future__ import annotations

import hashlib

import numpy as np
import pandas as pd

from .hosts import (
    BENIGN_CHILDREN,
    ROLE_DB,
    ROLE_PROCESSES,
    ROLE_WEB,
    Host,
)

# Mix of benign event kinds per role: (kind, weight).
_KIND_WEIGHTS = {
    "default": [("file_read", 3.0), ("file_write", 2.0), ("net", 3.0), ("start", 1.0)],
    ROLE_DB: [("file_read", 2.0), ("file_write", 2.0), ("net", 5.0), ("start", 0.5)],
    ROLE_WEB: [("file_read", 2.0), ("file_write", 1.0), ("net", 4.0), ("start", 2.0)],
}

_BENIGN_FILES = [
    "report_q3.docx",
    "notes.txt",
    "inbox.pst",
    "app.log",
    "cache.dat",
    "index.html",
    "config.ini",
]
_DB_FILES = ["master.mdf", "tempdb.mdf", "sql_error.log", "app_data.mdf"]

# External services workstations talk to (benign).
_BENIGN_EXTERNAL_IPS = [f"203.0.113.{i}" for i in range(1, 9)]


def _stable_pid(agentid: str, exe: str) -> int:
    """Deterministic 4-digit PID per (host, exe) — stable across calls so
    shared-variable joins on (pid, exe) behave like a real host."""
    h = hashlib.md5(f"{agentid}:{exe}".encode()).hexdigest()
    return 1000 + int(h[:6], 16) % 8000


def background_events(
    hosts: list[Host],
    *,
    start: str | pd.Timestamp = "2020-04-01 09:00:00",
    duration_s: int = 3600,
    events_per_host_per_min: float = 30.0,
    client_ip_pool: int = 8,
    seed: int = 7,
) -> pd.DataFrame:
    """Generate the benign multi-host event feed as a pandas frame.

    Events are unordered; ``feed.assemble`` sorts and assigns ``eid``.
    """
    start = pd.Timestamp(start)
    frames = []
    for hi, host in enumerate(hosts):
        g = np.random.default_rng(seed * 1009 + hi)
        n = max(1, int(events_per_host_per_min * duration_s / 60.0))
        offsets = np.sort(g.uniform(0, duration_s, n))
        ts = start + pd.to_timedelta(offsets, unit="s")

        procs, pweights = zip(*ROLE_PROCESSES[host.role])
        pw = np.array(pweights) / np.sum(pweights)
        subj = g.choice(procs, size=n, p=pw)

        kinds, kweights = zip(*_KIND_WEIGHTS.get(host.role, _KIND_WEIGHTS["default"]))
        kw = np.array(kweights) / np.sum(kweights)
        kind = g.choice(kinds, size=n, p=kw)

        pdf = pd.DataFrame(
            {
                "ts": ts,
                "agentid": host.agentid,
                "subj_exe": subj,
                "subj_pid": [_stable_pid(host.agentid, e) for e in subj],
                "op": "read",
                "obj_type": "file",
                "obj_exe": None,
                "obj_pid": None,
                "file_name": None,
                "srcip": None,
                "srcport": None,
                "dstip": None,
                "dstport": None,
                "amount": None,
            }
        )

        files = _DB_FILES if host.role == ROLE_DB else _BENIGN_FILES
        is_fr = kind == "file_read"
        is_fw = kind == "file_write"
        is_net = kind == "net"
        is_start = kind == "start"

        file_mask = is_fr | is_fw
        pdf.loc[file_mask, "file_name"] = g.choice(files, size=int(file_mask.sum()))
        pdf.loc[file_mask, "amount"] = np.round(
            g.lognormal(mean=7.0, sigma=1.0, size=int(file_mask.sum())), 0
        )
        pdf.loc[is_fw, "op"] = "write"

        # Network: DB server serves a pool of internal clients (dense
        # benign DBSCAN cluster); others mix internal + external.
        n_net = int(is_net.sum())
        if host.role == ROLE_DB:
            ip_pool = [f"10.0.1.{i}" for i in range(1, client_ip_pool + 1)]
            amounts = np.round(g.lognormal(mean=8.2, sigma=0.5, size=n_net), 0)
        else:
            ip_pool = _BENIGN_EXTERNAL_IPS + [h.ip for h in hosts if h is not host]
            amounts = np.round(g.lognormal(mean=7.3, sigma=0.8, size=n_net), 0)
        if n_net:
            pdf.loc[is_net, "op"] = g.choice(["read", "write"], size=n_net, p=[0.4, 0.6])
            pdf.loc[is_net, "obj_type"] = "ip"
            pdf.loc[is_net, "file_name"] = None
            pdf.loc[is_net, "dstip"] = g.choice(ip_pool, size=n_net)
            pdf.loc[is_net, "dstport"] = g.choice([443, 80, 1433, 445], size=n_net)
            pdf.loc[is_net, "srcip"] = host.ip
            pdf.loc[is_net, "srcport"] = g.integers(49152, 65535, size=n_net)
            pdf.loc[is_net, "amount"] = amounts

        # Process starts: only parents with a benign child set spawn.
        n_start = int(is_start.sum())
        if n_start:
            parents = [p for p in procs if p in BENIGN_CHILDREN] or [procs[0]]
            par = g.choice(parents, size=n_start)
            child = [g.choice(BENIGN_CHILDREN.get(p, ["notepad.exe"])) for p in par]
            pdf.loc[is_start, "subj_exe"] = par
            pdf.loc[is_start, "subj_pid"] = [
                _stable_pid(host.agentid, p) for p in par
            ]
            pdf.loc[is_start, "op"] = "start"
            pdf.loc[is_start, "obj_type"] = "proc"
            pdf.loc[is_start, "file_name"] = None
            pdf.loc[is_start, "amount"] = None
            pdf.loc[is_start, "obj_exe"] = child
            pdf.loc[is_start, "obj_pid"] = g.integers(2000, 9000, size=n_start)

        frames.append(pdf)
    return pd.concat(frames, ignore_index=True)
