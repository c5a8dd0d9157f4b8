"""Clustering substrate built from scratch (no sklearn offline).

The paper's outlier-based anomaly model clusters per-window state
points with DBSCAN and flags noise points as outliers (Query 4:
``method="DBSCAN(100000, 5)"``, Euclidean distance).
"""
from .dbscan import dbscan  # noqa: F401
