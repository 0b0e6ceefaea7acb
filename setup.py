"""Legacy shim: the container ships setuptools 65.5 without the ``wheel``
package, so PEP-660 editable installs fail with 'invalid command
bdist_wheel'. ``pip install -e . --no-use-pep517 --no-build-isolation``
(and plain ``pip install -e .`` on newer toolchains) works through this."""
from setuptools import setup

setup()
