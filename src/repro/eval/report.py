"""Markdown table rendering shared by the per-table jobs."""


def format_markdown(rows: list, columns: list, title: str = "") -> str:
    """Render dict rows as a GitHub markdown table.

    Args:
        rows: list of dicts (missing keys render as "-").
        columns: ordered list of (key, header) pairs.
        title: optional heading line.
    """
    def _fmt(v) -> str:
        if v is None:
            return "-"
        if isinstance(v, float):
            return f"{v:.3f}" if abs(v) < 10 else f"{v:.2f}"
        return str(v)

    lines = []
    if title:
        lines.append(f"### {title}\n")
    lines.append("| " + " | ".join(h for _, h in columns) + " |")
    lines.append("|" + "|".join("---" for _ in columns) + "|")
    for row in rows:
        lines.append("| " + " | ".join(_fmt(row.get(k)) for k, _ in columns) + " |")
    return "\n".join(lines) + "\n"
