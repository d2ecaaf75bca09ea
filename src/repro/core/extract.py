"""Offline pattern extraction: sample records -> pattern dictionary.

Pipeline (paper Fig. 1a plus one performance pre-partition):

1. *Shape grouping* — records are pre-grouped by a coarse structural
   signature (digit runs -> one symbol, letter runs -> another). This is
   purely a seeding optimisation: the greedy agglomerative algorithm is
   unchanged, it just starts from shape groups instead of singletons.
   Records produced by one template share a shape, so this removes the
   quadratic-in-sample-size cost the paper pays on a C++ implementation.
2. *Group folding* — each group is folded into one cluster by repeated
   minimal-encoding-length merges (the Algorithm 1 DP).
3. *Agglomerative merging* — the paper's greedy ELI merging with 1-gram
   pruning runs over the folded clusters until at most ``k`` remain.
4. *Encoder selection* — members are re-matched against their cluster
   pattern; each field gets the cheapest applicable Table-1 encoder.

The result is a :class:`PatternDictionary` mapping ids to patterns;
id 0 is reserved for outliers (records stored raw).
"""
from __future__ import annotations

import re
from dataclasses import dataclass

from .cluster import Cluster, agglomerate, merge_two
from .encoders import choose_encoder
from .pattern import Pattern, seq_to_segments

_DIGIT_RUN = re.compile(r"[0-9]+")
_ALPHA_RUN = re.compile(r"[A-Za-z]+")
_ALNUM_RUN = re.compile(r"[0-9A-Za-z]+")


def shape_signature(record: str) -> str:
    """Structural fingerprint: digit runs -> '0', letter runs -> 'a'."""
    return _ALPHA_RUN.sub("a", _DIGIT_RUN.sub("0", record))


def coarse_signature(record: str) -> str:
    """Coarser fingerprint: any alphanumeric run -> '#'.

    Used when :func:`shape_signature` fragments the sample into too many
    groups — hex tokens (uuids, session ids) interleave letter and digit
    runs randomly, so records from one template land in distinct shape
    groups. The punctuation skeleton is stable for such data.
    """
    return _ALNUM_RUN.sub("#", record)


@dataclass
class PatternDictionary:
    """Ordered pattern set; longest (most literal bytes) matched first."""

    patterns: list[Pattern]

    def __post_init__(self) -> None:
        self.patterns = sorted(
            self.patterns, key=lambda p: -p.literal_length
        )
        self._by_id = {p.pattern_id: p for p in self.patterns}
        if 0 in self._by_id:
            raise ValueError("pattern id 0 is reserved for outliers")

    def __len__(self) -> int:
        return len(self.patterns)

    def get(self, pattern_id: int) -> Pattern:
        return self._by_id[pattern_id]

    def match(self, record: str) -> tuple[Pattern, list[str]] | None:
        """Longest matching pattern and its residual fields (paper §3.2)."""
        for pat in self.patterns:
            fields = pat.match(record)
            if fields is not None:
                return pat, fields
        return None

    def match_encodable(self, record: str) -> tuple[Pattern, list[str]] | None:
        """Longest matching pattern whose encoders accept every field.

        Encoders are fitted on sampled values, so an unseen value can
        violate them; such a pattern must be skipped at compression time
        or the record would not round-trip.
        """
        for pat in self.patterns:
            fields = pat.match(record)
            if fields is not None and all(
                e.can_encode(v) for e, v in zip(pat.encoders, fields)
            ):
                return pat, fields
        return None

    def serialized_size(self) -> int:
        """Approximate on-disk size of the dictionary itself (bytes)."""
        total = 0
        for p in self.patterns:
            total += 4  # id
            total += sum(len(s) + 1 for s in p.segments if s is not None)
            total += p.n_fields  # 1 byte per encoder tag
        return total

    def to_dict(self) -> dict:
        return {"patterns": [p.to_dict() for p in self.patterns]}

    @classmethod
    def from_dict(cls, d: dict) -> "PatternDictionary":
        return cls(patterns=[Pattern.from_dict(p) for p in d["patterns"]])


def _fold_group(records: list[str], *, band: int | None, fold_cap: int) -> Cluster:
    """Fold same-shape records into one cluster by sequential merging.

    Only the first ``fold_cap`` members shape the pattern (diminishing
    returns past that); the rest are kept as members for encoder
    selection.
    """
    cluster = Cluster.singleton(records[0])
    for r in records[1:fold_cap]:
        cluster = merge_two(cluster, Cluster.singleton(r), band=band)
    cluster.members = list(records)
    return cluster


def extract_patterns(
    sample: list[str],
    *,
    k: int = 32,
    band: int | None = 64,
    fold_cap: int = 16,
    max_groups: int = 256,
    min_group: int = 1,
) -> PatternDictionary:
    """Run the full offline extraction over ``sample`` records."""
    if not sample:
        return PatternDictionary(patterns=[])
    groups: dict[str, list[str]] = {}
    for r in sample:
        groups.setdefault(shape_signature(r), []).append(r)
    if len(groups) > max(16, len(sample) // 4):
        # hex-heavy data fragments under the fine signature; re-group by
        # the punctuation skeleton so the agglomeration stays tractable
        groups = {}
        for r in sample:
            groups.setdefault(coarse_signature(r), []).append(r)
    # largest groups first; tiny tail groups beyond the cap are dropped
    # from training (their records become outliers or match other
    # clusters' patterns at compression time)
    ordered = sorted(groups.values(), key=len, reverse=True)[:max_groups]
    ordered = [g for g in ordered if len(g) >= min_group] or ordered[:1]
    clusters = [_fold_group(g, band=band, fold_cap=fold_cap) for g in ordered]
    clusters = agglomerate(clusters, k, band=band)
    return PatternDictionary(patterns=_build_patterns(clusters, band=band))


_SHORT_ALNUM = re.compile(r"^[0-9A-Za-z]{1,3}$")
_LEAD_ALNUM = re.compile(r"^[0-9A-Za-z]{1,2}")
_TAIL_ALNUM = re.compile(r"[0-9A-Za-z]{1,2}$")


def _simplify_segments(segments: list) -> list:
    """Fold spurious short alnum literals next to wildcards into fields.

    The common *subsequence* of k random digit strings is non-empty, so
    folded clusters keep spurious short alphanumeric literals inside
    value regions (e.g. ``cnt,16*4*7*`` or ``... 1*  2* ...``). Those
    fragment one field into several pieces and anchor the regex on
    accidental characters — worse ratio and brittle matching (a new
    record lacking the char mis-captures and falls back to an outlier).

    Two demotions, both leaving punctuation separators intact:
    - a whole 1–3-char alnum literal sandwiched between two wildcards;
    - a 1–2-char alnum run at the edge of a longer literal where that
      edge touches a wildcard (partial-token anchors like ``" 1"``).
    """
    out: list = []
    for idx, seg in enumerate(segments):
        prev_wild = idx > 0 and segments[idx - 1] is None
        next_wild = idx < len(segments) - 1 and segments[idx + 1] is None
        if seg is not None and prev_wild and next_wild and _SHORT_ALNUM.match(seg):
            seg = ""  # demote into the surrounding field
        elif seg is not None:
            if prev_wild:
                m = _LEAD_ALNUM.match(seg)
                # only a partial token: an alnum char must follow the run
                if m and len(seg) > m.end() and seg[m.end()].isalnum() is False:
                    seg = seg[m.end() :]
            if next_wild:
                m = _TAIL_ALNUM.search(seg)
                if m and m.start() > 0 and seg[m.start() - 1].isalnum() is False:
                    seg = seg[: m.start()]
        if seg == "":
            continue  # literal fully demoted; neighbours are wildcards
        if seg is None and out and out[-1] is None:
            continue  # collapse adjacent wildcards after a demotion
        out.append(seg)
    return out


def _collect_field_values(
    segments: list, members: list[str]
) -> list[list[str]] | None:
    """Match members against a probe pattern; values per field or None."""
    probe = Pattern(pattern_id=1, segments=segments)
    field_values: list[list[str]] = [[] for _ in range(probe.n_fields)]
    matched_any = False
    for record in members:
        fields = probe.match(record)
        if fields is None:
            continue  # can happen for unfolded members; they become outliers
        matched_any = True
        for vals, v in zip(field_values, fields):
            vals.append(v)
    return field_values if matched_any else None


def _punct_only(segments: list) -> list:
    """Demote every alphanumeric literal run, keeping only punctuation.

    Sub-patterns are mined from a *sample* of field values; alphanumeric
    literals found there (shared digit subsequences of random numbers)
    do not generalise to unseen values and would turn matching records
    into outliers. Punctuation separators are structural and stable.
    """
    out: list = []

    def push_wild() -> None:
        if not out or out[-1] is not None:
            out.append(None)

    def push_char(ch: str) -> None:
        if out and isinstance(out[-1], str):
            out[-1] += ch
        else:
            out.append(ch)

    for seg in segments:
        if seg is None:
            push_wild()
            continue
        for ch in seg:
            push_wild() if ch.isalnum() else push_char(ch)
    return out


def _subfold(values: list[str], *, band: int | None) -> list | None:
    """Mine a punctuation sub-pattern from one field's values.

    The greedy fold can lose template separators to crossing accidental
    digit matches (several free digit matches outweigh one separator
    byte-wise), leaving e.g. ``"96033,10,1"`` as one VARCHAR value. The
    remedy mirrors the paper's goal — extract *all* common structure —
    by running the same fold over the field's values and splicing the
    punctuation structure found (``*,*,*``) back into the parent
    pattern.
    """
    distinct = sorted(set(values))
    if len(distinct) < 2 or any(not v or len(v) > 128 for v in distinct):
        return None
    cluster = Cluster.singleton(distinct[0])
    for v in distinct[1:12]:
        cluster = merge_two(cluster, Cluster.singleton(v), band=band)
    sub = _punct_only(seq_to_segments(cluster.seq))
    if all(s is None for s in sub):
        return None
    return sub


def _match_count(segments: list, members: list[str]) -> int:
    probe = Pattern(pattern_id=1, segments=segments)
    return sum(1 for r in members if probe.match(r) is not None)


def _refine_segments(
    segments: list, members: list[str], *, band: int | None, rounds: int = 2
) -> list:
    """Iteratively splice sub-patterns mined from field values.

    A refinement is kept only if it does not reduce how many members the
    pattern matches — extra structure that fails on sampled members
    would fail even more on unseen records.
    """
    baseline = _match_count(segments, members)
    for _ in range(rounds):
        field_values = _collect_field_values(segments, members)
        if field_values is None:
            return segments
        new_segments: list = []
        fi = 0
        changed = False
        for seg in segments:
            if seg is not None:
                new_segments.append(seg)
                continue
            sub = _subfold(field_values[fi], band=band)
            fi += 1
            if sub is None:
                new_segments.append(None)
                continue
            changed = True
            for s in sub:
                if s is None and new_segments and new_segments[-1] is None:
                    continue
                new_segments.append(s)
        if not changed:
            break
        if _match_count(new_segments, members) < baseline:
            break  # the sub-structure does not generalise; keep the old one
        segments = new_segments
    return segments


def _build_patterns(
    clusters: list[Cluster], *, band: int | None = 64
) -> list[Pattern]:
    patterns: list[Pattern] = []
    next_id = 1
    for cluster in clusters:
        segments = _simplify_segments(seq_to_segments(cluster.seq))
        segments = _refine_segments(segments, cluster.members, band=band)
        field_values = _collect_field_values(segments, cluster.members)
        if field_values is None:
            continue
        encoders = [choose_encoder(vals) for vals in field_values]
        patterns.append(
            Pattern(pattern_id=next_id, segments=segments, encoders=encoders)
        )
        next_id += 1
    return patterns
