"""Material-MUP annotation filter (§II)."""
from repro.core import patterns as pt
from repro.core.material import filter_material


def test_no_annotation_keeps_all():
    mups = {pt.parse("1XX"), pt.parse("X23")}
    assert filter_material(mups, []) == mups


def test_exact_annotation_removed():
    mups = {pt.parse("1XX"), pt.parse("X23")}
    assert filter_material(mups, [pt.parse("X23")]) == {pt.parse("1XX")}


def test_dominating_annotation_removes_descendant_mup():
    # Infeasible region 1XX renders the more specific MUP 10X non-material.
    mups = {pt.parse("10X"), pt.parse("XX1")}
    assert filter_material(mups, [pt.parse("1XX")]) == {pt.parse("XX1")}


def test_dominated_annotation_does_not_remove_more_general_mup():
    # Annotating a narrow subregion does not excuse the broad MUP.
    mups = {pt.parse("1XX")}
    assert filter_material(mups, [pt.parse("10X")]) == {pt.parse("1XX")}


def test_material_max_covered_level_changes():
    mups = {pt.parse("12XX"), pt.parse("XX11"), pt.parse("111X")}
    material = filter_material(mups, [pt.parse("12XX")])
    # With the level-2 MUP 12XX annotated away and XX11 remaining,
    # the maximum covered level stays 1; annotating both level-2 MUPs
    # lifts it to 2.
    assert pt.max_covered_level(material, 4) == 1
    material2 = filter_material(mups, [pt.parse("12XX"), pt.parse("XX11")])
    assert pt.max_covered_level(material2, 4) == 2
