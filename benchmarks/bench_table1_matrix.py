"""Table I reproduction: fault-tolerance design-choice matrix, derived
from the engine's mode flags so the table reflects the code."""
from repro.harness.experiments import table1_rows


def test_table1_design_matrix(benchmark, emit):
    rows = benchmark.pedantic(table1_rows, rounds=1, iterations=1)
    emit("table1", rows, "Table I — FT design choices per system")
    by = {r["system"]: r for r in rows}
    assert by["Quokka"] == {
        "system": "Quokka", "description": "Pipelined SQL",
        "spooling": "no", "state_checkpoint": "no", "lineage": "yes",
    }
    assert by["Trino"]["spooling"] == "yes"
    assert by["SparkSQL"]["description"] == "Stagewise SQL"
    assert by["Flink"]["lineage"] == "no"
    assert by["Flink"]["state_checkpoint"] == "yes"
