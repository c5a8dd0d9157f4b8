"""Assemble the multi-host event feed: background + attack, time-ordered.

``assemble`` merges the benign background with the injected attack
trace, sorts by timestamp (the central server's aggregated stream is
time-ordered), and assigns globally unique ``eid``s. The attack
ground-truth (``step`` per eid) is returned separately so detection
tests/benchmarks can score alerts without the engine ever seeing it.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd

from ..core.schema import EVENT_COLUMNS, validate_events
from .attack import attack_events
from .background import background_events
from .hosts import Host, make_hosts


@dataclass
class Feed:
    """The assembled stream plus ground truth and the host inventory."""

    events: pd.DataFrame  # EVENT_COLUMNS, ts-sorted, unique eid
    truth: pd.DataFrame  # columns: eid, step (attack events only)
    hosts: list[Host]


def assemble(
    background: pd.DataFrame, attack: pd.DataFrame | None, hosts: list[Host]
) -> Feed:
    """Merge, sort, and number a feed from its parts."""
    bg = background.copy()
    bg["step"] = None
    parts = [bg] if attack is None or attack.empty else [bg, attack.copy()]
    pdf = pd.concat(parts, ignore_index=True)
    pdf = pdf.sort_values("ts", kind="stable").reset_index(drop=True)
    pdf["eid"] = range(1, len(pdf) + 1)
    truth = pdf.loc[pdf["step"].notna(), ["eid", "step"]].reset_index(drop=True)
    events = pdf[EVENT_COLUMNS].copy()
    problems = validate_events(events)
    if problems:
        raise ValueError(f"invalid synthetic feed: {problems}")
    return Feed(events=events, truth=truth, hosts=hosts)


def demo_feed(
    *,
    n_workstations: int = 4,
    start: str = "2020-04-01 09:00:00",
    duration_s: int = 3600,
    attack_start: str = "2020-04-01 09:30:00",
    events_per_host_per_min: float = 30.0,
    with_attack: bool = True,
    seed: int = 7,
) -> Feed:
    """The demo scenario: an hour of enterprise activity with the 5-step
    APT attack injected halfway through (defaults sized for unit tests;
    benchmarks raise the rate/duration)."""
    hosts = make_hosts(n_workstations=n_workstations)
    bg = background_events(
        hosts,
        start=start,
        duration_s=duration_s,
        events_per_host_per_min=events_per_host_per_min,
        seed=seed,
    )
    atk = attack_events(hosts, attack_start=attack_start) if with_attack else None
    return assemble(bg, atk, hosts)
