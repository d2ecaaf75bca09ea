"""Pattern objects: wildcard templates with per-field encoders.

A pattern (paper §3.2, Example 1) is ``Pat(c) = {p, L}`` — a common
subsequence ``p`` of the cluster's records with ``*`` wildcards marking
fields, and a list ``L`` of field encoders. Matching converts the
pattern to an anchored regular expression (the paper uses Hyperscan; we
use Python ``re``) whose groups are the residual field values. Because
the literals of a matched pattern appear in-order in the record,
concatenating literals with the captured fields always reconstructs the
record exactly, so compression is lossless by construction.
"""
from __future__ import annotations

import re
from dataclasses import dataclass, field

from .dp import WILDCARD
from .encoders import FieldEncoder, VARCHAR, encoder_from_spec


def seq_to_segments(seq: tuple) -> list:
    """Collapse a char-level pattern sequence into literal/wildcard segments.

    Returns a list where ``str`` entries are literal runs and ``None``
    entries are wildcards. Adjacent wildcards must already be collapsed
    (the DP traceback guarantees this).
    """
    segments: list = []
    lit: list[str] = []
    for tok in seq:
        if tok is WILDCARD:
            if lit:
                segments.append("".join(lit))
                lit = []
            segments.append(None)
        else:
            lit.append(tok)
    if lit:
        segments.append("".join(lit))
    return segments


@dataclass
class Pattern:
    """A compiled pattern: segments, encoders, and its dictionary id."""

    pattern_id: int
    segments: list  # str literals and None wildcards, in order
    encoders: list[FieldEncoder] = field(default_factory=list)

    def __post_init__(self) -> None:
        if not self.encoders:
            self.encoders = [VARCHAR] * self.n_fields
        if len(self.encoders) != self.n_fields:
            raise ValueError(
                f"pattern {self.pattern_id}: {self.n_fields} fields but "
                f"{len(self.encoders)} encoders"
            )
        self._regex = re.compile(self.to_regex(), re.DOTALL)

    @property
    def n_fields(self) -> int:
        return sum(1 for s in self.segments if s is None)

    @property
    def literal_length(self) -> int:
        """Bytes covered by the pattern — the tie-break for matching.

        The paper selects the *longest* matching pattern (§3.2) because
        more covered bytes means a smaller residual.
        """
        return sum(len(s) for s in self.segments if s is not None)

    def to_regex(self) -> str:
        """Anchored regex with one non-greedy group per wildcard."""
        parts = ["^"]
        segs = self.segments
        for idx, seg in enumerate(segs):
            if seg is None:
                # last wildcard may as well be greedy — anchored either way
                parts.append("(.*)$" if idx == len(segs) - 1 else "(.*?)")
            else:
                parts.append(re.escape(seg))
        if not segs or segs[-1] is not None:
            parts.append("$")
        return "".join(parts)

    def match(self, record: str) -> list[str] | None:
        """Residual field values if ``record`` matches, else ``None``."""
        m = self._regex.match(record)
        return list(m.groups()) if m else None

    def reconstruct(self, fields: list[str]) -> str:
        """Interleave literals with field values — inverse of :meth:`match`."""
        out: list[str] = []
        it = iter(fields)
        for seg in self.segments:
            out.append(next(it) if seg is None else seg)
        return "".join(out)

    # ---- serialisation (pattern dictionary broadcast / persistence) ----

    def to_dict(self) -> dict:
        return {
            "pattern_id": self.pattern_id,
            "segments": ["\x00" if s is None else "L" + s for s in self.segments],
            "encoders": [e.spec() for e in self.encoders],
        }

    @classmethod
    def from_dict(cls, d: dict) -> "Pattern":
        return cls(
            pattern_id=d["pattern_id"],
            segments=[None if s == "\x00" else s[1:] for s in d["segments"]],
            encoders=[encoder_from_spec(s) for s in d["encoders"]],
        )
