"""Pattern AST and parser (paper Definition 1)."""
import pytest

from repro.core.pattern import Plus, Seq, TypeP, parse_pattern, validate


@pytest.mark.parametrize(
    "text, expected",
    [
        ("A", TypeP("A")),
        ("A+", Plus(TypeP("A"))),
        ("(A)+", Plus(TypeP("A"))),
        ("SEQ(A, B)", Seq((TypeP("A"), TypeP("B")))),
        ("SEQ(A+, B)", Seq((Plus(TypeP("A")), TypeP("B")))),
        ("(SEQ(A+, B))+", Plus(Seq((Plus(TypeP("A")), TypeP("B"))))),
        ("SEQ(A+, B+)", Seq((Plus(TypeP("A")), Plus(TypeP("B"))))),
        (
            "SEQ(Accept, (SEQ(Call, Cancel))+, Finish)",
            Seq(
                (
                    TypeP("Accept"),
                    Plus(Seq((TypeP("Call"), TypeP("Cancel")))),
                    TypeP("Finish"),
                )
            ),
        ),
        ("seq(A, B)", Seq((TypeP("A"), TypeP("B")))),  # case-insensitive SEQ
        ("SEQ( A , B )", Seq((TypeP("A"), TypeP("B")))),  # whitespace
        ("SEQ(A, SEQ(B+, C))", Seq((TypeP("A"), Seq((Plus(TypeP("B")), TypeP("C")))))),
        ("M+", Plus(TypeP("M"))),
        ("((A))+", Plus(TypeP("A"))),
        ("SEQ(A, B, C, D)", Seq((TypeP("A"), TypeP("B"), TypeP("C"), TypeP("D")))),
    ],
)
def test_parse(text, expected):
    assert parse_pattern(text) == expected


@pytest.mark.parametrize(
    "text",
    ["", "SEQ(A)", "SEQ()", "A++", "SEQ(A,,B)", "(A", "A)", "SEQ(A B)", "+A", "SEQ(A,)"],
)
def test_parse_errors(text):
    with pytest.raises(ValueError):
        parse_pattern(text)


@pytest.mark.parametrize("text", ["SEQ(A, A)", "SEQ(A+, A)", "(SEQ(A, SEQ(B, A)))+"])
def test_duplicate_types_rejected(text):
    """A type may occur at most once (paper Section 2.1 assumption)."""
    with pytest.raises(ValueError, match="more than once"):
        parse_pattern(text)


@pytest.mark.parametrize(
    "text, types, length, kleene",
    [
        ("A", ["A"], 1, False),
        ("A+", ["A"], 1, True),
        ("SEQ(A, B)", ["A", "B"], 2, False),
        ("(SEQ(A+, B))+", ["A", "B"], 2, True),
        ("SEQ(Accept, (SEQ(Call, Cancel))+, Finish)",
         ["Accept", "Call", "Cancel", "Finish"], 4, True),
    ],
)
def test_properties(text, types, length, kleene):
    p = parse_pattern(text)
    assert p.types() == types
    assert p.length == length
    assert p.is_kleene() is kleene


@pytest.mark.parametrize(
    "text",
    ["A", "A+", "SEQ(A+, B)", "(SEQ(A+, B))+", "SEQ(Accept, (SEQ(Call, Cancel))+, Finish)"],
)
def test_str_roundtrip(text):
    p = parse_pattern(text)
    assert parse_pattern(str(p)) == p


def test_seq_requires_two_subpatterns():
    with pytest.raises(ValueError):
        Seq((TypeP("A"),))


def test_validate_passthrough():
    p = parse_pattern("SEQ(A, B)")
    assert validate(p) is p
