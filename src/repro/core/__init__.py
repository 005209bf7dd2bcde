"""The paper's core contribution: generalized lineage-aware temporal windows and the NegationJoins DataFrame operator."""
