"""Minimal encoding-length merging DP (paper Algorithms 1 + 2).

Given two clusters' patterns ``cs_x``/``cs_y`` (sequences of literal
characters and ``WILDCARD`` markers) and their sizes, compute the
*encoding length increment* (Def. 3) of merging them under the monotonic
VARCHAR cost model, and the merged pattern via traceback.

Cost model (Algorithm 2, VARCHAR):

- a literal char of ``cs_x`` demoted to residual costs ``size_x`` bytes
  (every member of ``C_x`` stores it as payload);
- opening a *new* field (the first residual element after a pattern
  element) costs one 1-byte length header per member: ``size_x+size_y``;
- an existing ``*`` of ``cs_x`` absorbed into a field refunds ``size_x``
  (its members' headers were already counted when ``EL(C_x)`` was
  computed).

The paper's Algorithm 1 keeps a single ``type[i][j]`` flag and leaves
tie-handling ambiguous (its lines 16-19 appear to swap the labels). We
instead run an exact two-layer DP — the best cost whose alignment ends
in a pattern element (``P``) and one ending in a residual element
(``R``) — which subsumes the flag and is unambiguous. Complexity stays
``O(n*m)`` (Problem 3).

Tie-breaking: under VARCHAR a 1-byte separator between two fields costs
the same kept-as-literal (one extra header) or demoted (one payload
byte) — the costs tie, but keeping the literal preserves the template
(INT eligibility, robust matching). Costs are therefore scaled by
``_SCALE`` and every demoted character pays a +2 epsilon, so among
byte-equal alignments the one with more pattern literals wins strictly.
A second +1 epsilon applies to *alphanumeric* diagonal matches:
when a punctuation anchor and an accidental shared digit compete for
the alignment (they often cross, so only one can match), the template
separator wins — accidental digit subsequences inside value fields are
noise, punctuation is structure. The returned ELI is descaled back to
(fractional) bytes.

Optimisations (paper §5.1 plus one standard alignment trick):

- ``bound``: the MIN-bound early termination — if every state on a row
  exceeds ``bound`` the merge cannot beat the current best pair, return
  ``None`` (pruning step 3 in §5.1);
- ``band``: restrict to a diagonal band (machine-generated records with
  a shared template align near the diagonal). ``band=None`` is the exact
  full DP; the clustering driver retries un-banded when the banded run
  returns no finite alignment.
"""
from __future__ import annotations

INF = float("inf")

#: cost units per byte; +1 epsilon per demoted char breaks byte-ties
_SCALE = 64

#: wildcard marker inside pattern sequences (paper writes ``*``)
WILDCARD = None

# traceback move codes
_DIAG_P, _DIAG_R = 0, 1  # into layer P from P / R
_UP_P, _UP_R, _LEFT_P, _LEFT_R = 2, 3, 4, 5  # into layer R


def merge_patterns(
    cs_x: tuple,
    cs_y: tuple,
    size_x: int,
    size_y: int,
    *,
    bound: float | None = None,
    band: int | None = None,
) -> tuple[float, tuple] | None:
    """Return ``(ELI, merged_pattern)`` or ``None`` if pruned/infeasible.

    ``cs_x``/``cs_y`` are tuples of 1-char strings and ``WILDCARD``;
    the merged pattern is canonical (no adjacent wildcards).
    """
    n, m = len(cs_x), len(cs_y)
    width = m + 1
    # two cost layers + move table per layer, flattened row-major
    p_prev = [INF] * width
    r_prev = [INF] * width
    moves_p = bytearray(n * width + width)
    moves_r = bytearray(n * width + width)

    sx = size_x * _SCALE
    sy = size_y * _SCALE
    hdr = sx + sy
    scaled_bound = None if bound is None else bound * _SCALE + 1

    p_prev[0] = 0.0
    # row 0: consume cs_y only (everything residual)
    for j in range(1, width):
        c = cs_y[j - 1]
        char_cost = -sy if c is WILDCARD else sy + 2
        from_p = p_prev[j - 1] + hdr + char_cost
        from_r = r_prev[j - 1] + char_cost
        if from_p <= from_r:
            r_prev[j] = from_p
            moves_r[j] = _LEFT_P
        else:
            r_prev[j] = from_r
            moves_r[j] = _LEFT_R
        p_prev[j] = INF

    for i in range(1, n + 1):
        cx = cs_x[i - 1]
        up_char = -sx if cx is WILDCARD else sx + 2
        diag_cost = 0 if cx is WILDCARD or not cx.isalnum() else 1
        p_cur = [INF] * width
        r_cur = [INF] * width
        base = i * width
        if band is None:
            lo, hi = 0, m
        else:
            center = (i * m) // max(n, 1)
            lo, hi = max(0, center - band), min(m, center + band)
        # j = 0 boundary: consume cs_x only
        if lo == 0:
            from_p = p_prev[0] + hdr + up_char
            from_r = r_prev[0] + up_char
            if from_p <= from_r:
                r_cur[0] = from_p
                moves_r[base] = _UP_P
            else:
                r_cur[0] = from_r
                moves_r[base] = _UP_R
        row_min = r_cur[0] if lo == 0 else INF
        for j in range(max(lo, 1), hi + 1):
            cy = cs_y[j - 1]
            # layer P: diagonal match of equal literal chars
            if cx is not WILDCARD and cy is not WILDCARD and cx == cy:
                dp, dr = p_prev[j - 1], r_prev[j - 1]
                if dp <= dr:
                    p_cur[j] = dp + diag_cost
                    moves_p[base + j] = _DIAG_P
                else:
                    p_cur[j] = dr + diag_cost
                    moves_p[base + j] = _DIAG_R
            # layer R: consume cs_x[i-1] (up) or cs_y[j-1] (left)
            left_char = -sy if cy is WILDCARD else sy + 2
            best = p_prev[j] + hdr + up_char
            mv = _UP_P
            v = r_prev[j] + up_char
            if v < best:
                best, mv = v, _UP_R
            v = p_cur[j - 1] + hdr + left_char
            if v < best:
                best, mv = v, _LEFT_P
            v = r_cur[j - 1] + left_char
            if v < best:
                best, mv = v, _LEFT_R
            r_cur[j] = best
            moves_r[base + j] = mv
            cell_min = p_cur[j] if p_cur[j] < best else best
            if cell_min < row_min:
                row_min = cell_min
        if scaled_bound is not None and row_min > scaled_bound:
            return None
        p_prev, r_prev = p_cur, r_cur

    final = min(p_prev[m], r_prev[m])
    if final == INF:
        return None
    merged = _traceback(
        cs_x, cs_y, moves_p, moves_r, width, p_prev[m] <= r_prev[m]
    )
    return final / _SCALE, merged


def _traceback(
    cs_x: tuple,
    cs_y: tuple,
    moves_p: bytearray,
    moves_r: bytearray,
    width: int,
    end_in_p: bool,
) -> tuple:
    """Walk the move tables back from ``(n, m)`` and build the merged pattern."""
    i, j = len(cs_x), len(cs_y)
    in_p = end_in_p
    rev: list = []
    while i > 0 or j > 0:
        idx = i * width + j
        if in_p:
            mv = moves_p[idx]
            rev.append(cs_x[i - 1])  # literal kept in the pattern
            in_p = mv == _DIAG_P
            i -= 1
            j -= 1
        else:
            mv = moves_r[idx]
            rev.append(WILDCARD)  # element demoted into a field
            if mv in (_UP_P, _UP_R):
                in_p = mv == _UP_P
                i -= 1
            else:
                in_p = mv == _LEFT_P
                j -= 1
    out: list = []
    for tok in reversed(rev):
        if tok is WILDCARD and out and out[-1] is WILDCARD:
            continue  # collapse adjacent wildcards into one field
        out.append(tok)
    return tuple(out)


def record_to_pattern(record: str) -> tuple:
    """A singleton cluster's pattern is the record itself (no wildcards)."""
    return tuple(record)
