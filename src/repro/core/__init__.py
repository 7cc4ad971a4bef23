"""The paper's contribution: linearized single-source engine, diagonal
correction (Algorithms 2 and 3), and the ExactSim driver."""
