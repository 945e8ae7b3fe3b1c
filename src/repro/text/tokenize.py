"""Tokenisation and character shingling used by both name-channel paths."""


def tokens(name: str) -> list:
    """Whitespace word tokens, lowercased. Empty names give no tokens."""
    return name.lower().split()


def shingles(name: str, n: int = 3) -> set:
    """Character n-gram set of a lowercased, space-collapsed name.

    Names shorter than ``n`` contribute the whole string as one shingle,
    so no entity ends up with an empty MinHash set.
    """
    s = " ".join(name.lower().split())
    if not s:
        return set()
    if len(s) <= n:
        return {s}
    return {s[i : i + n] for i in range(len(s) - n + 1)}
