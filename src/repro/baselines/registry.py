"""Uniform codec interface for the evaluation harnesses.

Every competitor in Tables 3–8 is exposed as a :class:`Codec` with two
modes mirroring the paper's two experimental settings:

- *line mode* (Table 3): ``compress_record(str) -> bytes`` /
  ``decompress_record(bytes) -> str`` — one record at a time, random
  access by construction;
- *file mode* (Table 4): ``compress_file(list[str]) -> bytes`` /
  ``decompress_file(bytes) -> list[str]`` — records newline-joined into
  one block, the LZ-friendly setting.

``train(samples)`` runs each codec's offline phase (Zstd/LZ4 dictionary
training, FSST table construction, PBC pattern extraction); the paper
excludes this offline cost from compression time and so do we.
"""
from __future__ import annotations

from ..core.pbc import PBCCodec, ResidualCodec, train_pbc
from ..fsst import FsstTable, train_fsst
from . import lz4, lzma_codec, snappy, zstdlike
from .dict_train import train_dictionary


class Codec:
    """Base: block codecs get line mode per-record for free."""

    name = "base"
    #: does line mode support per-record random access (paper §7.2.2)
    random_access = True

    def train(self, samples: list[str]) -> None:  # offline phase
        return None

    # -- block primitives (override) --
    def _compress(self, data: bytes) -> bytes:
        raise NotImplementedError

    def _decompress(self, data: bytes) -> bytes:
        raise NotImplementedError

    # -- line mode --
    def compress_record(self, record: str) -> bytes:
        return self._compress(record.encode("utf-8"))

    def decompress_record(self, data: bytes) -> str:
        return self._decompress(data).decode("utf-8")

    # -- file mode --
    def compress_file(self, records: list[str]) -> bytes:
        return self._compress("\n".join(records).encode("utf-8"))

    def decompress_file(self, data: bytes) -> list[str]:
        return self._decompress(data).decode("utf-8").split("\n")


class SnappyCodec(Codec):
    name = "Snappy"

    def _compress(self, data: bytes) -> bytes:
        return snappy.compress(data)

    def _decompress(self, data: bytes) -> bytes:
        return snappy.decompress(data)


class Lz4Codec(Codec):
    """LZ4; ``with_dict`` is the paper's ``LZ4(dict)`` short-record mode."""

    def __init__(self, with_dict: bool = False):
        self.with_dict = with_dict
        self.name = "LZ4(dict)" if with_dict else "LZ4"
        self.zdict = b""

    def train(self, samples: list[str]) -> None:
        if self.with_dict:
            self.zdict = train_dictionary([s.encode("utf-8") for s in samples])

    def _compress(self, data: bytes) -> bytes:
        return lz4.compress(data, zdict=self.zdict)

    def _decompress(self, data: bytes) -> bytes:
        return lz4.decompress(data, zdict=self.zdict)


class ZstdCodec(Codec):
    """Zstd substitute (zlib; DESIGN.md §2); ``with_dict`` = ``Zstd(dict)``."""

    def __init__(self, with_dict: bool = False, level: int = 6):
        self.with_dict = with_dict
        self.level = level
        self.name = "Zstd(dict)" if with_dict else "Zstd"
        self.zdict = b""

    def train(self, samples: list[str]) -> None:
        if self.with_dict:
            self.zdict = train_dictionary([s.encode("utf-8") for s in samples])

    def _compress(self, data: bytes) -> bytes:
        return zstdlike.compress(data, level=self.level, zdict=self.zdict)

    def _decompress(self, data: bytes) -> bytes:
        return zstdlike.decompress(data, zdict=self.zdict)


class LzmaCodec(Codec):
    name = "LZMA"

    def __init__(self, preset: int = 6):
        self.preset = preset

    def _compress(self, data: bytes) -> bytes:
        return lzma_codec.compress(data, preset=self.preset)

    def _decompress(self, data: bytes) -> bytes:
        return lzma_codec.decompress(data)


class FsstCodec(Codec):
    name = "FSST"

    def __init__(self) -> None:
        self.table: FsstTable | None = None

    def train(self, samples: list[str]) -> None:
        self.table = train_fsst([s.encode("utf-8") for s in samples])

    def _require(self) -> FsstTable:
        if self.table is None:
            raise RuntimeError("FSST codec used before train()")
        return self.table

    def _compress(self, data: bytes) -> bytes:
        return self._require().encode(data)

    def _decompress(self, data: bytes) -> bytes:
        return self._require().decode(data)


class _FsstResidual(ResidualCodec):
    """FSST as PBC's residual codec (the paper's ``PBC_F``).

    High-entropy residuals (random digits, hex) can *inflate* under a
    small symbol table, so each record keeps the shorter of raw and
    FSST-coded payload behind a 1-byte flag — still strictly
    per-record, so random access is untouched and ``PBC_F`` is never
    more than one byte behind ``PBC``.
    """

    name = "fsst"

    def __init__(self, table: FsstTable):
        self.table = table

    def encode(self, data: bytes) -> bytes:
        coded = self.table.encode(data)
        if len(coded) < len(data):
            return b"\x01" + coded
        return b"\x00" + data

    def decode(self, data: bytes) -> bytes:
        if data[:1] == b"\x01":
            return self.table.decode(data[1:])
        return data[1:]


class PbcCodec(Codec):
    """PBC and its variants.

    ``residual='fsst'`` -> PBC_F (per-record, random access);
    ``block='zstd'|'lzma'`` -> PBC_Z / PBC_L (file mode only — the PBC
    block stream is further compressed block-wise, so per-record random
    access is deliberately given up, as in the paper).
    """

    def __init__(
        self,
        residual: str | None = None,
        block: str | None = None,
        k: int = 32,
        train_kwargs: dict | None = None,
    ):
        if residual and block:
            raise ValueError("residual and block backends are exclusive")
        self.residual = residual
        self.block = block
        self.k = k
        self.train_kwargs = train_kwargs or {}
        self.codec: PBCCodec | None = None
        self.random_access = block is None
        suffix = {"fsst": "_F", None: ""}.get(residual, "")
        suffix = {"zstd": "_Z", "lzma": "_L", None: suffix}[block]
        self.name = f"PBC{suffix}"

    def train(self, samples: list[str]) -> None:
        dictionary = train_pbc(samples, k=self.k, **self.train_kwargs)
        rc = None
        if self.residual == "fsst":
            plain = PBCCodec(dictionary)
            residuals = []
            for s in samples:
                c = plain.compress_record(s)
                if c[0] != 0:
                    residuals.append(c[1:])  # payload after the varint id
            rc = _FsstResidual(train_fsst(residuals))
        self.codec = PBCCodec(dictionary, residual_codec=rc)

    def _require(self) -> PBCCodec:
        if self.codec is None:
            raise RuntimeError(f"{self.name} used before train()")
        return self.codec

    def compress_record(self, record: str) -> bytes:
        if self.block:
            raise RuntimeError(f"{self.name} is a file-mode codec")
        return self._require().compress_record(record)

    def decompress_record(self, data: bytes) -> str:
        return self._require().decompress_record(data)

    def compress_file(self, records: list[str]) -> bytes:
        blob = self._require().compress_block(records)
        if self.block == "zstd":
            return zstdlike.compress(blob, level=6)
        if self.block == "lzma":
            return lzma_codec.compress(blob, preset=6)
        return blob

    def decompress_file(self, data: bytes) -> list[str]:
        if self.block == "zstd":
            data = zstdlike.decompress(data)
        elif self.block == "lzma":
            data = lzma_codec.decompress(data)
        return self._require().decompress_block(data)


def make_codec(name: str, **kwargs) -> Codec:
    """Factory keyed by the names used in the paper's tables."""
    factories = {
        "Snappy": lambda: SnappyCodec(),
        "LZ4": lambda: Lz4Codec(),
        "LZ4(dict)": lambda: Lz4Codec(with_dict=True),
        "Zstd": lambda: ZstdCodec(),
        "Zstd(dict)": lambda: ZstdCodec(with_dict=True),
        "LZMA": lambda: LzmaCodec(),
        "FSST": lambda: FsstCodec(),
        "PBC": lambda: PbcCodec(**kwargs),
        "PBC_F": lambda: PbcCodec(residual="fsst", **kwargs),
        "PBC_Z": lambda: PbcCodec(block="zstd", **kwargs),
        "PBC_L": lambda: PbcCodec(block="lzma", **kwargs),
    }
    try:
        return factories[name]()
    except KeyError:
        raise ValueError(f"unknown codec {name!r}") from None
