"""Tab. 1 reproduction: class counts must match the paper exactly."""
from repro.annotations.model import CLASS_E, CLASS_N, CLASS_P, CLASS_S
from repro.annotations.study import (
    COREUTILS, PAPER_TABLE1, POSIX, counts, table1_rows,
)


def test_coreutils_counts_match_paper():
    c = counts(COREUTILS)
    assert c == {CLASS_S: 22, CLASS_P: 8, CLASS_N: 13, CLASS_E: 57}


def test_posix_counts_match_paper():
    c = counts(POSIX)
    assert c == {CLASS_S: 28, CLASS_P: 9, CLASS_N: 13, CLASS_E: 105}


def test_totals():
    assert sum(counts(COREUTILS).values()) == 100
    assert sum(counts(POSIX).values()) == 155


def test_no_duplicates_within_study():
    for study in (COREUTILS, POSIX):
        all_cmds = [c for cmds in study.values() for c in cmds]
        assert len(all_cmds) == len(set(all_cmds))


def test_paper_examples_classified_as_paper_says():
    # Tab. 1's own example commands
    assert "tr" in COREUTILS[CLASS_S] and "cat" in COREUTILS[CLASS_S]
    assert "grep" in POSIX[CLASS_S]
    assert "sort" in COREUTILS[CLASS_P]
    assert "sha1sum" in COREUTILS[CLASS_N]
    assert "env" in COREUTILS[CLASS_E] and "whoami" in COREUTILS[CLASS_E]


def test_table_rows_align_with_paper_within_tolerance():
    paper = {cls: (cu, cup, px, pxp) for cls, cu, cup, px, pxp in PAPER_TABLE1}
    for row in table1_rows():
        cu, cup, px, pxp = paper[row["class"]]
        assert row["coreutils"] == cu
        assert row["posix"] == px
        # percentages differ from the paper's by <2 points (their totals
        # include a few more historical binaries)
        assert abs(row["coreutils_pct"] - cup) < 2.0
        assert abs(row["posix_pct"] - pxp) < 2.0


def test_annotation_library_consistent_with_study():
    """Commands annotated in the library agree with the study's default
    class (modulo flag-dependent refinements, which the library models and
    the flat study cannot)."""
    from repro.annotations import LIBRARY, resolve_invocation

    study_class = {}
    for study in (COREUTILS, POSIX):
        for cls, cmds in study.items():
            for c in cmds:
                study_class.setdefault(c, cls)
    # class is flag-dependent or source-like (no stream input) in the
    # library's finer model; the flat study records the common default
    flag_dependent = {"xargs", "sed", "echo", "seq", "file", "curl"}
    for name in LIBRARY:
        if name not in study_class or name in flag_dependent:
            continue
        argv = ["a", "b"] if name in ("comm", "diff") else []
        assert resolve_invocation(name, argv).cls == study_class[name], name
