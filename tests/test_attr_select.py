"""Tests for Algorithm 1 — automated attribute selection (EER)."""
import pytest

from repro.core import select_attributes


@pytest.fixture(scope="module")
def music_selection(spark, music_data):
    return select_attributes(
        spark, music_data.records, music_data.config.attr_names(),
        gamma=0.85, r=0.8, seed=0,
    )


def test_music_selects_table7_attributes(music_selection):
    """Table VII: Music selects exactly {title, artist, album}."""
    assert sorted(music_selection.selected) == ["album", "artist", "title"]


def test_id_least_significant(music_selection):
    s = music_selection.scores
    assert s["id"] == max(s.values())
    assert s["id"] > 0.98  # shuffling a random per-source id is a no-op


def test_informative_attrs_rank_above_noise(music_selection):
    s = music_selection.scores
    assert s["title"] < s["year"]
    assert s["artist"] < s["number"]
    assert s["album"] < s["length"]


def test_scores_are_similarities_in_range(music_selection):
    assert all(-0.3 <= v <= 1.001 for v in music_selection.scores.values())


def test_gamma_monotone(spark, music_data):
    loose = select_attributes(
        spark, music_data.records, music_data.config.attr_names(),
        gamma=0.95, r=0.5, seed=0,
    )
    tight = select_attributes(
        spark, music_data.records, music_data.config.attr_names(),
        gamma=0.5, r=0.5, seed=0,
    )
    assert set(tight.selected) <= set(loose.selected)


def test_geo_selects_name(spark, geo_data):
    sel = select_attributes(
        spark, geo_data.records, geo_data.config.attr_names(),
        gamma=0.8, r=0.8, seed=0,
    )
    assert "name" in sel.selected
    assert sel.scores["name"] == min(sel.scores.values())


def test_single_attribute_short_circuit(spark, geo_data):
    sel = select_attributes(spark, geo_data.records, ["name"], gamma=0.8)
    assert sel.selected == ["name"]


def test_never_selects_empty(spark, geo_data):
    # absurdly tight gamma still keeps the most significant attribute
    sel = select_attributes(
        spark, geo_data.records, geo_data.config.attr_names(),
        gamma=-1.0, r=0.5, seed=0,
    )
    assert len(sel.selected) == 1


def test_selection_deterministic(spark, geo_data):
    a = select_attributes(spark, geo_data.records, geo_data.config.attr_names(),
                          gamma=0.8, r=0.5, seed=1)
    b = select_attributes(spark, geo_data.records, geo_data.config.attr_names(),
                          gamma=0.8, r=0.5, seed=1)
    assert a.scores == b.scores
    assert a.selected == b.selected
