"""Tests for the synthetic dataset generators (Table 2 substitution)."""
import pytest

from repro.datasets import (
    GENERATORS,
    JSON_DATASETS,
    LOG_DATASETS,
    PAPER_AVG_LEN,
    dataset_df,
    records,
)

ALL = list(GENERATORS)


@pytest.mark.parametrize("name", ALL)
def test_deterministic(name):
    assert records(name, 30, seed=5) == records(name, 30, seed=5)


@pytest.mark.parametrize("name", ALL)
def test_seed_changes_content(name):
    assert records(name, 30, seed=1) != records(name, 30, seed=2)


@pytest.mark.parametrize("name", ALL)
def test_no_newlines_or_empties(name):
    for r in records(name, 50, seed=3):
        assert "\n" not in r
        assert len(r) > 0


@pytest.mark.parametrize("name", ALL)
def test_count(name):
    assert len(records(name, 17, seed=0)) == 17


@pytest.mark.parametrize("name", ALL)
def test_avg_length_tracks_table2(name):
    recs = records(name, 60, seed=1)
    avg = sum(len(r.encode()) for r in recs) / len(recs)
    paper = PAPER_AVG_LEN[name]
    assert 0.4 * paper <= avg <= 2.0 * paper, f"{name}: {avg} vs paper {paper}"


def test_json_datasets_parse():
    import json

    for name in JSON_DATASETS:
        for r in records(name, 10, seed=2):
            json.loads(r)


def test_log_datasets_listed():
    assert set(LOG_DATASETS) <= set(GENERATORS)
    assert set(JSON_DATASETS) <= set(GENERATORS)


def test_uuid_records_look_like_uuids():
    import uuid

    for r in records("uuid", 20, seed=7):
        assert uuid.UUID(r).version == 4


@pytest.mark.parametrize("name", ["KV1", "Apache", "unece"])
def test_dataset_df_schema(spark, name):
    df = dataset_df(spark, name, 25, seed=1)
    assert df.columns == ["id", "record"]
    assert df.count() == 25
    row = df.filter("id = 3").collect()[0]
    assert row["record"] == records(name, 25, seed=1)[3]
