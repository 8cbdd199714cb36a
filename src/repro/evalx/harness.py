"""Timing + table-formatting helpers shared by jobs and benchmarks."""
from __future__ import annotations

import time
from typing import Callable, Dict, Iterable, List, Sequence, Tuple


def timed(fn: Callable, *args, **kwargs) -> Tuple[object, float]:
    """(result, elapsed milliseconds)."""
    t0 = time.perf_counter()
    out = fn(*args, **kwargs)
    return out, (time.perf_counter() - t0) * 1e3


def consume_topk(gen: Iterable, k: int) -> List:
    """Pull the first k items from a progressive generator."""
    out = []
    for item in gen:
        out.append(item)
        if len(out) >= k:
            break
    return out


def fmt_rows(rows: List[Dict], cols: Sequence[str], title: str = "") -> str:
    """Fixed-width text table (also valid Markdown) from a list of dicts."""
    def fmt(v):
        if isinstance(v, float):
            return f"{v:,.2f}"
        return str(v)

    widths = {c: max(len(c), *(len(fmt(r.get(c, ""))) for r in rows)) for c in cols}
    header = "| " + " | ".join(c.ljust(widths[c]) for c in cols) + " |"
    sep = "|" + "|".join("-" * (widths[c] + 2) for c in cols) + "|"
    body = [
        "| " + " | ".join(fmt(r.get(c, "")).rjust(widths[c]) for c in cols) + " |"
        for r in rows
    ]
    out = [header, sep, *body]
    if title:
        out.insert(0, f"### {title}")
    return "\n".join(out)
