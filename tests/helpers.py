"""Shared test helpers."""
import pandas as pd


def canon_alerts(df: pd.DataFrame) -> pd.DataFrame:
    """Canonical ordering (sets -> sorted tuples) for frame equality."""
    df = df.copy()
    for c in df.columns:
        df[c] = df[c].map(
            lambda v: tuple(sorted(v)) if isinstance(v, (frozenset, set)) else v
        )
    if df.empty:
        return df.reset_index(drop=True)
    return df.sort_values(list(df.columns), kind="stable").reset_index(drop=True)
