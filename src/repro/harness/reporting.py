"""Markdown rendering of experiment results (EXPERIMENTS.md tables)."""
from __future__ import annotations

from repro.harness.runner import SweepPoint


def _fmt_lat(p: SweepPoint) -> str:
    if p.latency_ms is None:
        return "DNF"
    suffix = f" ({p.dnf_frac:.0%} DNF)" if p.dnf_frac else ""
    return f"{p.latency_ms:,.2f}{suffix}"


def _fmt_mem(p: SweepPoint) -> str:
    b = p.peak_state_bytes
    for unit, div in (("GB", 1e9), ("MB", 1e6), ("KB", 1e3)):
        if b >= div:
            return f"{b / div:,.1f} {unit}"
    return f"{b} B"


def _fmt_tp(p: SweepPoint) -> str:
    if p.throughput_eps is None:
        return "-"
    return f"{p.throughput_eps:,.0f}"


def to_markdown(points: list[SweepPoint], title: str) -> str:
    """One markdown table per experiment: rows = sweep values, columns =
    approach metrics (latency ms / peak state / throughput ev/s)."""
    if not points:
        return f"### {title}\n\n(no data)\n"
    x_name = points[0].x_name
    approaches = list(dict.fromkeys(p.approach for p in points))
    xs = list(dict.fromkeys(p.x for p in points))
    by = {(p.x, p.approach): p for p in points}
    lines = [f"### {title}", ""]
    header = [x_name] + [
        f"{a} lat(ms) | {a} mem | {a} ev/s" for a in approaches
    ]
    lines.append("| " + " | ".join(header) + " |")
    lines.append("|" + "---|" * (1 + 3 * len(approaches)))
    for x in xs:
        cells = [str(x)]
        for a in approaches:
            p = by.get((x, a))
            if p is None:
                cells += ["n/a", "n/a", "n/a"]
            else:
                cells += [_fmt_lat(p), _fmt_mem(p), _fmt_tp(p)]
        lines.append("| " + " | ".join(cells) + " |")
    lines.append("")
    return "\n".join(lines)
