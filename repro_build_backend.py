"""Minimal offline PEP 517/660 build backend for this repo.

The container has no network and no ``wheel`` package, so setuptools'
``editable_wheel``/``bdist_wheel`` commands are unavailable.  This backend
builds wheels with nothing but the stdlib: the editable wheel is a ``.pth``
file pointing at ``src/``; the regular wheel copies ``src/repro`` in.
"""
import base64
import hashlib
import os
import zipfile

NAME, VERSION = "repro", "0.1.0"
DIST = f"{NAME}-{VERSION}"
WHEEL_NAME = f"{DIST}-py3-none-any.whl"

_METADATA = f"""Metadata-Version: 2.1\nName: {NAME}\nVersion: {VERSION}\nRequires-Python: >=3.11\n"""
_WHEEL = "Wheel-Version: 1.0\nGenerator: repro-local\nRoot-Is-Purelib: true\nTag: py3-none-any\n"


def _record_line(arcname: str, data: bytes) -> str:
    digest = base64.urlsafe_b64encode(hashlib.sha256(data).digest()).rstrip(b"=").decode()
    return f"{arcname},sha256={digest},{len(data)}"


def _write_wheel(path: str, files: dict) -> None:
    record_arc = f"{DIST}.dist-info/RECORD"
    files = dict(files)
    files[f"{DIST}.dist-info/METADATA"] = _METADATA.encode()
    files[f"{DIST}.dist-info/WHEEL"] = _WHEEL.encode()
    record = "\n".join(_record_line(a, d) for a, d in files.items())
    record += f"\n{record_arc},,\n"
    with zipfile.ZipFile(path, "w", zipfile.ZIP_DEFLATED) as z:
        for arc, data in files.items():
            z.writestr(arc, data)
        z.writestr(record_arc, record)


def build_editable(wheel_directory, config_settings=None, metadata_directory=None):
    src = os.path.abspath("src")
    _write_wheel(
        os.path.join(wheel_directory, WHEEL_NAME),
        {f"{NAME}_editable.pth": (src + "\n").encode()},
    )
    return WHEEL_NAME


def build_wheel(wheel_directory, config_settings=None, metadata_directory=None):
    files = {}
    root = os.path.abspath(os.path.join("src", NAME))
    for dirpath, _dirnames, filenames in os.walk(root):
        for fn in filenames:
            if fn.endswith((".pyc", ".pyo")):
                continue
            full = os.path.join(dirpath, fn)
            arc = os.path.relpath(full, os.path.dirname(root)).replace(os.sep, "/")
            with open(full, "rb") as fh:
                files[arc] = fh.read()
    _write_wheel(os.path.join(wheel_directory, WHEEL_NAME), files)
    return WHEEL_NAME


def build_sdist(sdist_directory, config_settings=None):  # pragma: no cover
    raise NotImplementedError("sdist not supported by this offline backend")
