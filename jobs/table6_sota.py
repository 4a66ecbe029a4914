"""Table VI — qualitative SOTA feature matrix.

The literature rows are static facts transcribed from the paper; the Ver
row is *derived* from the components implemented in this repository, so
the matrix stays honest about what this reproduction actually covers.

    python jobs/table6_sota.py [--json]
"""
import importlib

from _common import emit, parser

STATIC_ROWS = [
    # technique, input, handles_noise, column_selection, needs_pkfk,
    # join_graph_search, view_distillation, view_presentation
    ("SQuID", "Relational", "N", "Automatic", "Y", "Online", "N", "N"),
    ("S4/FastTopK", "Relational", "Y", "Automatic", "Y", "Online",
     "Individual signal", "N"),
    ("MWeaver", "Relational", "N", "Automatic", "Y", "Online",
     "Individual signal", "N"),
    ("DuoQuest", "Natural language", "Y", "Automatic", "Y", "Online",
     "Individual signal", "N"),
    ("Aurum", "N", "-", "N", "N, Offline index", "Online", "N", "N"),
    ("Josie", "N", "-", "N", "N, Offline index", "Online", "N", "N"),
    ("Lazo", "N", "-", "N", "N, Offline index", "Online", "N", "N"),
    ("SeeDB", "N", "-", "N", "N", "N", "N", "Y"),
    ("RONIN", "N", "-", "N", "N", "N", "N", "Y"),
]


def ver_row() -> tuple:
    """Derive Ver's capabilities from what this repo implements."""
    have = lambda mod: importlib.util.find_spec(mod) is not None  # noqa: E731
    qbe = have("repro.core.qbe")
    cs = have("repro.core.column_selection")
    idx = have("repro.discovery.index")
    jgs = have("repro.core.join_graph_search")
    vd = have("repro.core.distillation")
    vp = have("repro.core.presentation")
    return (
        "Ver (this repo)",
        "Relational" if qbe else "N",
        "Y" if cs else "N",
        "Automatic, Interactive" if cs else "N",
        "N, Offline index" if idx else "Y",
        "Online" if jgs else "N",
        "Individual, Dependent signal" if vd else "N",
        "Y" if vp else "N",
    )


def main() -> None:
    args = parser(__doc__).parse_args()
    cols = ["technique", "view_spec_input", "handles_noise",
            "column_selection", "discovery_engine", "join_graph_search",
            "view_distillation", "view_presentation"]
    rows = [dict(zip(cols, r)) for r in STATIC_ROWS + [ver_row()]]
    emit(rows, args.json)


if __name__ == "__main__":
    main()
