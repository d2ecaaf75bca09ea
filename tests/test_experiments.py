"""Integration tests: each table harness runs at quick scale and the
paper's qualitative shape holds."""
import pytest

from repro.experiments import table2, table3, table4, table5, table6, table7, table8


@pytest.fixture(scope="module")
def t3_rows(spark):
    return table3.run(spark, scale="quick", datasets=["KV1", "Apache"], seed=0)


@pytest.fixture(scope="module")
def t4_rows(spark):
    return table4.run(spark, scale="quick", datasets=["KV1", "Apache"], seed=0)


def _by(rows, **kv):
    out = [r for r in rows if all(r[k] == v for k, v in kv.items())]
    assert out, f"no row for {kv}"
    return out[0]


class TestTable2:
    def test_all_datasets_reported(self, spark):
        rows = table2.run(spark, scale="quick")
        assert len(rows) == 16
        for r in rows:
            assert 0.4 * r["paper_avg_len"] <= r["avg_len"] <= 2.0 * r["paper_avg_len"]
        assert table2.render(rows)


class TestTable3:
    def test_all_cells_present(self, t3_rows):
        assert len(t3_rows) == 2 * 5
        for r in t3_rows:
            assert 0 < r["ratio"] <= 1.2
            assert r["comp_mbs"] > 0 and r["decomp_mbs"] > 0

    def test_pbc_wins_ratio(self, t3_rows):
        """Paper shape: PBC/PBC_F lead line-by-line compression ratio."""
        for ds in ("KV1", "Apache"):
            pbc_f = _by(t3_rows, dataset=ds, codec="PBC_F")["ratio"]
            for base in ("FSST", "LZ4(dict)", "Zstd(dict)"):
                assert pbc_f < _by(t3_rows, dataset=ds, codec=base)["ratio"]

    def test_render(self, t3_rows):
        text = table3.render(t3_rows)
        assert "PBC_F" in text and "paper_ratio" in text


class TestTable4:
    def test_all_cells_present(self, t4_rows):
        assert len(t4_rows) == 2 * 6

    def test_pbc_l_wins_file_ratio(self, t4_rows):
        """Paper shape: PBC_L gives the best block ratio on templated data."""
        for ds in ("KV1", "Apache"):
            pbc_l = _by(t4_rows, dataset=ds, codec="PBC_L")["ratio"]
            for base in ("Snappy", "LZ4", "Zstd", "LZMA"):
                assert pbc_l < _by(t4_rows, dataset=ds, codec=base)["ratio"]

    def test_lzma_beats_fast_lz(self, t4_rows):
        for ds in ("KV1", "Apache"):
            lzma = _by(t4_rows, dataset=ds, codec="LZMA")["ratio"]
            assert lzma < _by(t4_rows, dataset=ds, codec="Snappy")["ratio"]
            assert lzma < _by(t4_rows, dataset=ds, codec="LZ4")["ratio"]


class TestTable5:
    def test_ratio_parity_and_speed_win(self, spark):
        rows = table5.run(spark, scale="quick", datasets=["Apache", "HDFS"])
        lr = _by(rows, codec="LogReducer")
        pbc = _by(rows, codec="PBC_L")
        # paper: near-parity in ratio (within ~2x either way). The paper's
        # large decompression-speed gap comes from C++ PBC decode; both
        # decoders are pure Python here, so only comparable-order speed is
        # asserted (see EXPERIMENTS.md).
        assert pbc["ratio"] < 2.2 * lr["ratio"]
        assert pbc["decomp_mbs"] > 0.3 * lr["decomp_mbs"]
        assert pbc["comp_mbs"] > lr["comp_mbs"]
        assert table5.render(rows)


class TestTable6:
    @pytest.fixture(scope="class")
    def rows(self, spark):
        # averaged over JSON datasets, as the paper reports Table 6
        return table6.run(spark, scale="quick", datasets=["cities", "github"])

    def test_modes_present(self, rows):
        modes = {(r["mode"], r["codec"]) for r in rows}
        assert ("record", "PBC") in modes and ("file", "PBC_L") in modes

    def test_pbc_beats_json_formats_record_level(self, rows):
        # the paper's claim is about the cross-dataset average: BP-D can
        # win an individual dataset (cities: floats as short decimals)
        pbc = _by(rows, mode="record", codec="PBC_F")["ratio"]
        assert pbc < _by(rows, mode="record", codec="Ion-B")["ratio"]
        assert pbc < _by(rows, mode="record", codec="BP-D")["ratio"]

    def test_file_mode_strong(self, rows):
        assert _by(rows, mode="file", codec="PBC_L")["ratio"] < 0.3


class TestTable7:
    def test_both_methods_compress_hard(self, spark):
        rows = table7.run(spark, scale="quick", datasets=["github"])
        r = rows[0]
        assert r["PBC_L"] < 0.2
        assert r["BP-D+LZMA"] < 0.4
        assert table7.render(rows)


class TestTable8:
    def test_case_study_shape(self, spark):
        rows = table8.run(spark, scale="quick")
        for wl in ("A", "B"):
            un = _by(rows, workload=wl, codec="Uncompressed")
            zs = _by(rows, workload=wl, codec="Zstd")
            pf = _by(rows, workload=wl, codec="PBC_F")
            assert un["memory_pct"] == pytest.approx(100.0)
            # paper shape: PBC_F stores smaller than the Zstd solution
            assert pf["memory_pct"] < zs["memory_pct"]
            assert pf["memory_pct"] < 60
            for r in (un, zs, pf):
                assert r["set_qps"] > 0 and r["get_qps"] > 0
        assert table8.render(rows)
