"""Enterprise host inventory for the synthetic monitoring feed.

Roles mirror the demo setup (Figure 2): employee workstations (the
victim runs Outlook/Excel), a web server running Apache, a SQL database
server (the exfiltration target), and generic file servers. Each role
determines which benign processes run there and what they touch.
"""
from __future__ import annotations

from dataclasses import dataclass

ROLE_WORKSTATION = "workstation"
ROLE_WEB = "web"
ROLE_DB = "db"
ROLE_FILE = "file"

# Benign per-role process inventory: (exe, weight). Weights bias which
# subject the background generator picks for an event.
ROLE_PROCESSES = {
    ROLE_WORKSTATION: [
        ("outlook.exe", 3.0),
        ("excel.exe", 2.0),
        ("winword.exe", 2.0),
        ("chrome.exe", 4.0),
        ("explorer.exe", 2.0),
        ("teams.exe", 2.0),
    ],
    ROLE_WEB: [
        ("apache.exe", 6.0),
        ("php-cgi.exe", 3.0),
        ("logrotate.exe", 1.0),
    ],
    ROLE_DB: [
        ("sqlservr.exe", 6.0),
        ("sqlagent.exe", 2.0),
        ("cmd.exe", 1.0),
        ("backup_svc.exe", 1.0),
    ],
    ROLE_FILE: [
        ("smbd.exe", 5.0),
        ("rsync.exe", 2.0),
        ("antivirus.exe", 1.0),
    ],
}

# The benign child-process invariant for Apache (the invariant-based
# demo query learns exactly this set and alerts on anything else).
APACHE_BENIGN_CHILDREN = ["php-cgi.exe", "rotatelogs.exe", "sh.exe"]

# Benign children for other parents (keeps 'start' events realistic).
BENIGN_CHILDREN = {
    "outlook.exe": ["chrome.exe", "winword.exe", "excel.exe"],
    "explorer.exe": ["chrome.exe", "notepad.exe", "teams.exe"],
    "cmd.exe": ["ipconfig.exe", "whoami.exe"],
    "sqlservr.exe": ["sqldumper.exe"],
    "apache.exe": APACHE_BENIGN_CHILDREN,
}


@dataclass(frozen=True)
class Host:
    """One monitored host: stable id, role, and its subnet IP."""

    agentid: str
    role: str
    ip: str


def make_hosts(
    n_workstations: int = 4, n_web: int = 1, n_db: int = 1, n_file: int = 1
) -> list[Host]:
    """Deterministic inventory; the first workstation is the demo victim
    and the first db host is the exfiltration target."""
    hosts: list[Host] = []
    idx = 1
    for count, role in [
        (n_workstations, ROLE_WORKSTATION),
        (n_web, ROLE_WEB),
        (n_db, ROLE_DB),
        (n_file, ROLE_FILE),
    ]:
        for i in range(count):
            hosts.append(
                Host(agentid=f"{role}-{i + 1:02d}", role=role, ip=f"10.0.0.{idx}")
            )
            idx += 1
    return hosts


def victim_host(hosts: list[Host]) -> Host:
    """The workstation the attack's initial compromise lands on."""
    return next(h for h in hosts if h.role == ROLE_WORKSTATION)


def db_host(hosts: list[Host]) -> Host:
    """The database server the attack exfiltrates from."""
    return next(h for h in hosts if h.role == ROLE_DB)


def web_host(hosts: list[Host]) -> Host:
    """The Apache web server (target of the invariant query)."""
    return next(h for h in hosts if h.role == ROLE_WEB)
