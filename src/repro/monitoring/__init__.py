"""Simulated enterprise system-monitoring substrate.

The paper collects kernel audit events (auditd/ETW/DTrace) from 150
production hosts. We have no such deployment, so this package generates
a deterministic synthetic event feed with the same SVO shape and
security attributes: role-based benign background activity per host
(``background``), the five-step APT attack trace of the demo
(``attack``), and a combiner that merges them into one multi-host,
time-ordered feed (``feed``). See DESIGN.md §3 for the substitution
argument.
"""
