"""Appendix D made executable: the CVP→LambdaCC reduction must compute
circuits when driven by sequential Louvain best moves at λ = 0."""
import numpy as np
import pytest

from repro.core.pcompleteness import Circuit, Gate, louvain_decode, reduction_graph


def _random_circuit(n_inputs: int, n_gates: int, seed: int) -> Circuit:
    rng = np.random.default_rng(seed)
    gates = []
    for j in range(n_gates):
        hi = n_inputs + j
        a, b = rng.integers(0, hi, size=2)
        if a == b:
            b = (b + 1) % hi
        gates.append(Gate(op=("and" if rng.random() < 0.5 else "or"), a=int(a), b=int(b)))
    return Circuit(n_inputs=n_inputs, gates=gates)


class TestCircuitEval:
    def test_and_or(self):
        c = Circuit(2, [Gate("and", 0, 1), Gate("or", 0, 1)])
        assert c.evaluate([True, False]) == [False, True]
        assert c.evaluate([True, True]) == [True, True]
        assert c.evaluate([False, False]) == [False, False]


class TestReductionGraph:
    def test_layout_shapes(self):
        c = Circuit(2, [Gate("or", 0, 1)])
        g, layout = reduction_graph(c, [True, False])
        assert g.n == 2 + 2 + 2 + 2  # t, f, 2 anchors, 2 inputs, gate + gate'
        assert layout["t"] == 0 and layout["f"] == 1
        # (t,f) edge must be strongly negative.
        tf = g.edges[(g.edges["u"] == 0) & (g.edges["v"] == 1)]
        assert len(tf) == 1 and tf["w"].iloc[0] < 0

    def test_gate_prime_edge_dominates_inputs(self):
        c = Circuit(2, [Gate("or", 0, 1)])
        g, layout = reduction_graph(c, [True, True])
        gk, gkp = layout["gate"][0], layout["gate_prime"][0]
        e = g.edges
        w_prime = e[(e["u"] == min(gk, gkp)) & (e["v"] == max(gk, gkp))]["w"].iloc[0]
        w_in = e[(e["v"] == gk) & (e["u"].isin(layout["input"]))]["w"]
        assert (w_prime > 2 * w_in).all()


class TestLouvainSolvesCVP:
    @pytest.mark.parametrize(
        "inputs", [[True, True], [True, False], [False, True], [False, False]]
    )
    def test_single_or_gate(self, inputs):
        c = Circuit(2, [Gate("or", 0, 1)])
        assert louvain_decode(c, inputs) == c.evaluate(inputs)

    @pytest.mark.parametrize(
        "inputs", [[True, True], [True, False], [False, False]]
    )
    def test_single_and_gate(self, inputs):
        c = Circuit(2, [Gate("and", 0, 1)])
        assert louvain_decode(c, inputs) == c.evaluate(inputs)

    def test_two_level_circuit(self):
        # out = (x0 AND x1) OR x2
        c = Circuit(3, [Gate("and", 0, 1), Gate("or", 3, 2)])
        for bits in range(8):
            inputs = [(bits >> i) & 1 == 1 for i in range(3)]
            assert louvain_decode(c, inputs) == c.evaluate(inputs), inputs

    @pytest.mark.parametrize("seed", [0, 1, 2, 3, 4])
    def test_random_circuits(self, seed):
        c = _random_circuit(n_inputs=3, n_gates=6, seed=seed)
        rng = np.random.default_rng(seed + 100)
        inputs = [bool(b) for b in rng.integers(0, 2, size=3)]
        assert louvain_decode(c, inputs, seed=seed) == c.evaluate(inputs)

    @pytest.mark.parametrize("seed", [7, 8])
    def test_deeper_chain(self, seed):
        # A chain of gates each consuming the previous output.
        rng = np.random.default_rng(seed)
        gates = []
        for j in range(8):
            prev = 1 + j  # previous gate (or input 1 for the first)
            gates.append(
                Gate(op=("or" if rng.random() < 0.5 else "and"), a=0, b=prev)
            )
        c = Circuit(2, gates)
        inputs = [bool(rng.integers(0, 2)), bool(rng.integers(0, 2))]
        assert louvain_decode(c, inputs, seed=seed) == c.evaluate(inputs)
