"""The paper's contribution: the LambdaCC Louvain framework (SEQ + PAR)."""
