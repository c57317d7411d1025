"""The paper's algorithms: AMPC + MPC versions of MIS, maximal
matching, minimum spanning forest, 1-vs-2-Cycle, and the theory-side
machinery (ternarization, KKT sampling, F-light edges, treaps)."""
