"""Causal-DAG substrate: ground-truth DAGs, RandomData generation, and
the bnlearn-style baseline structure-learning algorithms."""
from repro.dags.baselines import constraint_based_structure, hill_climb, parent_f1
from repro.dags.dag import DAG
from repro.dags.random_dags import BayesNet, random_bayes_net, random_dag

__all__ = [
    "BayesNet",
    "DAG",
    "constraint_based_structure",
    "hill_climb",
    "parent_f1",
    "random_bayes_net",
    "random_dag",
]
