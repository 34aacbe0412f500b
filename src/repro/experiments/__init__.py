"""One harness per evaluation table/experiment (Exp-I..V, Fig 6)."""
