"""Table 9 — expressive power of the event aggregation approaches."""
import pytest

from repro.baselines.registry import APPROACHES, supports
from repro.core.granularity import Semantics
from repro.core.predicates import AdjacentPredicate
from repro.core.query import Query

# Table 9, transcribed: (kleene, ANY, NEXT, CONT, adjacent preds, online).
TABLE9 = {
    "flink": (False, True, False, True, True, False),
    "sase": (True, True, True, True, True, False),
    "greta": (True, True, False, False, True, True),
    "aseq": (False, True, False, False, False, True),
    "cogra": (True, True, True, True, True, True),
}


@pytest.mark.parametrize("name", list(TABLE9))
def test_registry_matches_table9(name):
    kleene, any_, next_, cont, preds, online = TABLE9[name]
    info = APPROACHES[name]
    assert info.kleene is kleene
    assert (Semantics.ANY in info.semantics) is any_
    assert (Semantics.NEXT in info.semantics) is next_
    assert (Semantics.CONT in info.semantics) is cont
    assert info.adjacent_predicates is preds
    assert info.online is online


@pytest.mark.parametrize("name", list(TABLE9))
@pytest.mark.parametrize("semantics", list(Semantics))
@pytest.mark.parametrize("with_preds", [False, True])
def test_supports_is_consistent_with_table9(name, semantics, with_preds):
    preds = (
        (AdjacentPredicate("A", "v", "<", "A", "v"),) if with_preds else ()
    )
    cq = Query(
        pattern="(SEQ(A+, B))+", semantics=semantics, adjacent_predicates=preds
    ).compile()
    _, any_, next_, cont, preds_ok, _ = TABLE9[name]
    sem_ok = {
        Semantics.ANY: any_, Semantics.NEXT: next_, Semantics.CONT: cont
    }[semantics]
    assert supports(name, cq) is (sem_ok and (preds_ok or not with_preds))


def test_only_cogra_covers_everything():
    full = [n for n, row in TABLE9.items() if all(row)]
    assert full == ["cogra"]
