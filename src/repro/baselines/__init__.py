"""Baseline compressors (paper §7.1.3) built from scratch or stdlib.

No libzstd/liblz4/libsnappy exist in this sandbox (no network), so:

- LZ4 and Snappy are pure-Python reimplementations of their block
  formats (greedy hash-table matchers) — format-faithful, slow;
- Zstd is substituted by zlib/DEFLATE (the same LZ77+entropy-coding
  family, including preset-dictionary support standing in for
  ``zstd --train``) — see DESIGN.md §2;
- LZMA is the real C-backed stdlib implementation.
"""
